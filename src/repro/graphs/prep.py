"""Graph preparation pipeline (paper §3.1) as DataFrame jobs.

1. Remove isolated vertices (no incident edge) and reindex the remaining
   vertices to dense zero-based ids — order-preserving, so any per-vertex
   side data (e.g. SBM labels) can be realigned with the returned mapping.
2. For directed graphs, :func:`repro.core.graph.Graph.symmetrized` builds
   the undirected version used by undirected-only sparsifiers.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.graph import Graph


def used_vertices(g: Graph) -> DataFrame:
    """DataFrame[v] of vertices with at least one incident edge."""
    return (
        g.edges.select(F.col("src").alias("v"))
        .unionByName(g.edges.select(F.col("dst").alias("v")))
        .distinct()
    )


def drop_isolated_and_reindex(g: Graph) -> tuple[Graph, np.ndarray]:
    """§3.1 step 1: drop isolated vertices, reindex dense and zero-based.

    Returns ``(graph, old_ids)`` where ``old_ids[new_id] = old_id``
    (sorted ascending, so the relabelling is order-preserving).
    """
    mapping = used_vertices(g).select(
        F.col("v").alias("old"),
        (F.row_number().over(Window.orderBy("v")) - 1).alias("new"),
    )
    n_new = mapping.count()
    e = (
        g.edges.join(mapping.withColumnRenamed("old", "src"), "src")
        .drop("src")
        .withColumnRenamed("new", "src")
        .join(mapping.withColumnRenamed("old", "dst"), "dst")
        .drop("dst")
        .withColumnRenamed("new", "dst")
        .select("src", "dst", "weight")
    )
    old_ids = np.sort(
        mapping.select("old").toPandas()["old"].to_numpy(np.int64)
    )
    return (
        Graph.from_edges(
            e, directed=g.directed, weighted=g.weighted, n=n_new, name=g.name
        ),
        old_ids,
    )


def isolated_count(g: Graph) -> int:
    """Number of vertices of ``g`` with no incident edge."""
    return g.n - used_vertices(g).count()
