"""Benchmark for Table 3 (loading + measuring all 14 stand-ins)."""
from repro.core import figures


def test_table3(benchmark, spark):
    def run():
        return figures.table3_datasets(spark, scale=0.1, seed=0)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(df) == 14
