"""Fig. 13 harness: train on the sparsified graph, test on the full graph.

Per §3.3.4 the network is trained with the *sparsified* adjacency (the
expensive phase the paper wants to shrink) and evaluated with the *full*
adjacency — revealing how much full-graph structure the sparsified graph
taught the model. Also provides the paper's two reference lines: the
full-graph model (green) and the empty-graph / MLP-only model (red).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.graph import Graph
from repro.gnn.data import NodeData
from repro.gnn.models import (
    MeanAggregator,
    accuracy,
    gcn_forward,
    macro_auroc,
    sage_forward,
    train_cluster_gcn,
    train_sage,
)
from repro.metrics.clustering import lpa_communities


@dataclass
class GnnResult:
    accuracy: float
    auroc: float


def _edge_arrays(g: Graph) -> tuple[np.ndarray, np.ndarray]:
    s, d, _ = g.to_arrays()
    return s, d


def eval_graphsage(
    train_graph: Graph, full_graph: Graph, data: NodeData, *, seed: int = 0,
    epochs: int = 150,
) -> GnnResult:
    """GraphSAGE trained on ``train_graph``, tested on ``full_graph``."""
    ts, td = _edge_arrays(train_graph)
    fs, fd = _edge_arrays(full_graph)
    agg_train = MeanAggregator(ts, td, train_graph.n, directed=train_graph.directed)
    agg_full = MeanAggregator(fs, fd, full_graph.n, directed=full_graph.directed)
    params = train_sage(
        data.x, data.y, data.train_mask, agg_train, epochs=epochs, seed=seed
    )
    logits, _ = sage_forward(params, data.x, agg_full)
    return GnnResult(
        accuracy=accuracy(logits, data.y, data.test_mask),
        auroc=macro_auroc(logits, data.y, data.test_mask),
    )


def eval_cluster_gcn(
    train_graph: Graph, full_graph: Graph, data: NodeData, *, seed: int = 0,
    epochs: int = 60, n_batches: int = 8,
) -> GnnResult:
    """ClusterGCN trained on LPA-partitioned ``train_graph`` batches."""
    ts, td = _edge_arrays(train_graph)
    fs, fd = _edge_arrays(full_graph)
    if len(ts) > 0:
        labels = (
            lpa_communities(train_graph)
            .toPandas()
            .sort_values("v")["label"]
            .to_numpy(np.int64)
        )
    else:
        labels = np.arange(train_graph.n, dtype=np.int64)
    params = train_cluster_gcn(
        data.x, data.y, data.train_mask, ts, td, labels,
        directed=train_graph.directed, epochs=epochs, seed=seed,
        n_batches=n_batches,
    )
    agg_full = MeanAggregator(
        fs, fd, full_graph.n, directed=full_graph.directed, self_loops=True
    )
    logits, _ = gcn_forward(params, data.x, agg_full)
    return GnnResult(
        accuracy=accuracy(logits, data.y, data.test_mask),
        auroc=macro_auroc(logits, data.y, data.test_mask),
    )


def empty_graph(g: Graph) -> Graph:
    """The paper's red-line baseline: same vertices, no edges."""
    return g.with_edges(g.edges.limit(0), name=f"{g.name}|empty")
