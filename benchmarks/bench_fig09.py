"""Benchmark for the Fig 9 clustering-coefficient sweep.

One pedantic round: these are end-to-end Spark experiment pipelines, not
microbenchmarks — the number of interest is the wall time of one full
(reduced-size) regeneration of the table.
"""
from repro.core import figures

SETTINGS = dict(scale=0.15, rhos=[0.5], n_runs=1, seed=0, sparsifiers=['RN', 'LSim'])


def test_fig09(benchmark, spark):
    def run():
        return figures.fig09_clustering_coefficients(spark, **SETTINGS)

    result = benchmark.pedantic(run, rounds=1, iterations=1)
    assert result
