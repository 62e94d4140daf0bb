"""Shared building blocks for the sparsifiers.

Three ideas recur across the algorithms:

* **Exact-k selection** — pick exactly ``k`` edges by a (score, tie-break)
  order: a global sort + limit, fine at reproduction scale and fully
  deterministic given the ordering columns.
* **Per-vertex incidence ranks** — rank each vertex's incident edges by
  some per-edge key (degree, similarity, random); an undirected edge gets
  the *minimum* of its two endpoint ranks, so "vertex keeps its top-r
  edges" becomes a single filter on the canonical edge list.
* **Integer-threshold solving** — K-Neighbor-style sparsifiers control
  the prune rate through an integer knob (k, or a rank threshold); we
  pick the knob value whose kept-edge count is closest to the target from
  the cumulative rank histogram.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.graph import Graph


def target_edges(m: int, rho: float) -> int:
    """|E'| = (1 - rho)|E|, at least 1 (Definition 1)."""
    return max(1, int(round((1.0 - rho) * m)))


def take_k(edges: DataFrame, k: int, order_cols: list) -> DataFrame:
    """Exactly ``k`` edges under a deterministic total order."""
    return edges.orderBy(*order_cols).limit(k).select("src", "dst", "weight")


def incidence_ranked(g: Graph, key_col, *, seed_cols: list | None = None) -> DataFrame:
    """Adjacency rows ranked per vertex by ``key_col`` ascending.

    Returns DataFrame[src, dst, weight, deg, rank]: one row per (vertex,
    incident edge) — two rows per undirected edge, one per directed edge.
    ``rank`` is 1-based within each ``src``; ``deg`` is the vertex degree
    (out-degree for directed graphs). Ties are broken by ``dst``.
    """
    adj = g.adjacency().withColumn("_key", key_col)
    w_rank = Window.partitionBy("src").orderBy(F.col("_key"), F.col("dst"))
    w_deg = Window.partitionBy("src")
    return (
        adj.withColumn("rank", F.row_number().over(w_rank))
        .withColumn("deg", F.count("*").over(w_deg))
        .drop("_key")
    )


def canonical_min_rank(g: Graph, ranked: DataFrame, extra_min: list[str] = ()) -> DataFrame:
    """Fold per-endpoint ranks back onto the canonical edge list.

    For undirected graphs each canonical edge has rows for both endpoints
    in ``ranked``; the edge-level rank (and any column in ``extra_min``)
    is the minimum across endpoints. Directed graphs pass through.
    Returns DataFrame[src, dst, weight, rank, *extra_min].
    """
    aggs = [F.min("rank").alias("rank")] + [
        F.min(c).alias(c) for c in extra_min
    ]
    if g.directed:
        return ranked.groupBy("src", "dst", "weight").agg(*aggs)
    return (
        ranked.select(
            F.least("src", "dst").alias("src"),
            F.greatest("src", "dst").alias("dst"),
            "weight",
            "rank",
            *extra_min,
        )
        .groupBy("src", "dst", "weight")
        .agg(*aggs)
    )


def best_int_threshold(ranked_edges: DataFrame, k_target: int) -> int:
    """Integer rank threshold whose kept-edge count best matches target.

    ``ranked_edges`` must have an integer ``rank`` column at edge (not
    incidence) granularity. Keeping edges with ``rank <= t`` is monotone
    in ``t``; we pick the ``t`` minimizing |count(t) - k_target| from the
    cumulative rank histogram (one aggregate job).
    """
    hist = (
        ranked_edges.groupBy("rank").count().orderBy("rank").toPandas()
    )
    cum = 0
    best_t, best_gap = 1, float("inf")
    for _, row in hist.iterrows():
        cum += int(row["count"])
        gap = abs(cum - k_target)
        if gap < best_gap:
            best_gap, best_t = gap, int(row["rank"])
    return best_t
