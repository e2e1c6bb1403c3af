"""Benchmark: Table 5 (+7) — UTune MRR under full vs selective running."""
from repro.eval.table5 import run_table5


def test_table5(benchmark):
    out = benchmark.pedantic(
        run_table5, kwargs={"budget_s": 60.0}, rounds=1, iterations=1
    )
    # Paper shape: selective running yields at least as many records.
    assert out["n_records_selective"] >= out["n_records_full"]
    # Learned models are competitive with / better than the rule-based
    # BDT on selective index prediction (small-sample noise tolerated).
    best_learned = max(
        out["cells"][("index", "selective", m, "leaf")]
        for m in ("DT", "RF", "SVM", "kNN", "RC")
    )
    bdt = out["cells"][("index", "selective", "BDT", "leaf")]
    assert best_learned >= bdt - 0.05
