"""Benchmark for the Fig 7 Katz-centrality sweep.

One pedantic round: these are end-to-end Spark experiment pipelines, not
microbenchmarks — the number of interest is the wall time of one full
(reduced-size) regeneration of the table.
"""
from repro.core import figures

SETTINGS = dict(scale=0.15, rhos=[0.5], n_runs=1, seed=0, sparsifiers=['RN', 'LD'], top_k=20, iters=20)


def test_fig07(benchmark, spark):
    def run():
        return figures.fig07_katz(spark, **SETTINGS)

    result = benchmark.pedantic(run, rounds=1, iterations=1)
    assert result
