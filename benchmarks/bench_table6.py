"""Benchmark: Table 6 (+8/9) — overall speedups over Lloyd on all
datasets, run through the distributed SparkRunner."""
import pytest

from repro.eval.table6 import run_table6, train_utune


@pytest.fixture(scope="module")
def utune():
    return train_utune()


def test_table6(spark, utune, benchmark):
    rows = benchmark.pedantic(
        run_table6,
        kwargs={"spark": spark, "utune": utune, "ks": (10, 100), "seeds": (0,)},
        rounds=1,
        iterations=1,
    )
    assert len(rows) == 30  # 15 datasets × 2 k
    # Paper-shape spot checks (work-model speedups are recorded in
    # results/table6.md; wall-clock shapes are asserted loosely).
    by = {(r["dataset"], r["k"]): r for r in rows}
    nyc = by[("NYC", 100)]
    assert nyc["INDE_pruned"] > 0.9          # index prunes NYC hard
    power = by[("Power", 100)]
    assert power["SEQU_pruned"] > power["INDE_pruned"]  # bounds beat index


def test_table6_bigk(spark, utune, benchmark):
    """The paper's large-k regime on the two largest stand-ins."""
    rows = benchmark.pedantic(
        run_table6,
        kwargs={
            "spark": spark, "utune": utune, "ks": (300,), "seeds": (0,),
            "datasets": ["BigCross", "NYC"], "write": False,
        },
        rounds=1,
        iterations=1,
    )
    assert len(rows) == 2
