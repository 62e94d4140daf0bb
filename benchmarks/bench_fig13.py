"""Benchmark for the Fig 13 GNN experiment (GraphSAGE + ClusterGCN)."""
from repro.core import figures

SETTINGS = dict(
    scale=0.15, rhos=[0.5], n_runs=1, seed=0, sparsifiers=["RN", "LD"],
    epochs_sage=40, epochs_cgcn=15,
)


def test_fig13(benchmark, spark):
    def run():
        return figures.fig13_gnn(spark, **SETTINGS)

    result = benchmark.pedantic(run, rounds=1, iterations=1)
    assert result
