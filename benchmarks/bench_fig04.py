"""Benchmark for the Fig 4 distance-metric sweep.

One pedantic round: these are end-to-end Spark experiment pipelines, not
microbenchmarks — the number of interest is the wall time of one full
(reduced-size) regeneration of the table.
"""
from repro.core import figures

SETTINGS = dict(scale=0.12, rhos=[0.5], n_runs=1, seed=0, sparsifiers=['RN', 'LD'], diam_sparsifiers=['RN', 'LD'], n_sources=6, diameter_seeds=4)


def test_fig04(benchmark, spark):
    def run():
        return figures.fig04_distance(spark, **SETTINGS)

    result = benchmark.pedantic(run, rounds=1, iterations=1)
    assert result
