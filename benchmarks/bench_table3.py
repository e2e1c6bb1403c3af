"""Benchmark: Table 3 — first bound-active iteration access breakdown."""
from repro.eval.table3 import run_table3


def test_table3(benchmark):
    rows = benchmark.pedantic(run_table3, kwargs={"k": 100}, rounds=1, iterations=1)
    by = {r["method"]: r for r in rows}
    # Paper-shape assertions: SEQU prunes hard, UniK needs the fewest
    # point accesses, the index pays node accesses instead of bounds.
    assert by["SEQU"]["pruned"] > 0.5
    assert by["UniK"]["point_access"] < by["Lloyd"]["point_access"]
    assert by["INDE"]["node_access"] > 0
