"""Benchmark for Table 1 (registry rendering — trivially fast)."""
from repro.core import figures


def test_table1(benchmark):
    df = benchmark(figures.table1_metric_applicability)
    assert len(df) == 16
