"""Benchmark for the Fig 11 PageRank sweep (directed + undirected)."""
from repro.core import figures

SETTINGS = dict(
    scale=0.15, rhos=[0.5], n_runs=1, seed=0,
    sparsifiers_a=["RN", "ERu"], sparsifiers_b=["RN", "RD"],
    top_k=20, iters=15,
)


def test_fig11(benchmark, spark):
    def run():
        return figures.fig11_pagerank(spark, **SETTINGS)

    result = benchmark.pedantic(run, rounds=1, iterations=1)
    assert result
