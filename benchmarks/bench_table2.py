"""Benchmark: Table 2 — Ball-tree construction over all stand-ins."""
from repro.eval.table2 import run_table2


def test_table2(benchmark):
    rows = benchmark.pedantic(run_table2, rounds=1, iterations=1)
    assert len(rows) == 12
