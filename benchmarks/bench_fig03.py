"""Benchmark for the Fig 3 quadratic-form sweep.

One pedantic round: these are end-to-end Spark experiment pipelines, not
microbenchmarks — the number of interest is the wall time of one full
(reduced-size) regeneration of the table.
"""
from repro.core import figures

SETTINGS = dict(scale=0.15, rhos=[0.3, 0.7], n_runs=1, seed=0, sparsifiers=['RN', 'ERw'], k_vectors=50)


def test_fig03(benchmark, spark):
    def run():
        return figures.fig03_quadratic_form(spark, **SETTINGS)

    result = benchmark.pedantic(run, rounds=1, iterations=1)
    assert result
