"""Benchmark: Table 4 — cross-method rating summary grid."""
from repro.eval.table4 import run_table4


def test_table4(benchmark):
    rows = benchmark.pedantic(run_table4, rounds=1, iterations=1)
    assert len(rows) == 14
