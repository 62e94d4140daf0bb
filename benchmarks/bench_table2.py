"""Benchmark for Table 2 (all 13 sparsifier variants verified on a probe)."""
from repro.core import figures


def test_table2(benchmark, spark):
    def run():
        return figures.table2_sparsifier_characteristics(spark, scale=0.1, seed=0)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(df) == 13
