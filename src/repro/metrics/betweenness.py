"""Betweenness centrality (§2.2.3) via sampled Brandes as DataFrame jobs.

Exact betweenness needs APSP; the paper uses Geisberger-style sampling
(500 sources). We run Brandes' algorithm from a sampled source batch:

* **Forward** — level-synchronous BFS carrying path counts: the frontier
  table (s, v, dist, sigma) expands one hop per round, sigma summing
  over predecessors (unweighted shortest paths, as in Brandes).
* **Backward** — walk the BFS DAG from the deepest level up, adding
  delta(u) += sigma_u/sigma_w * (1 + delta_w) over DAG edges (u, w).

Betweenness(v) = sum over sampled sources of delta(s, v). With all
vertices as sources this is exact (tests check it against networkx).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.core.iterate import materialize


def bfs_sigma(g: Graph, sources: list[int], *, max_iter: int = 128) -> DataFrame:
    """DataFrame[s, v, dist, sigma]: hop distance and #shortest paths."""
    adj = materialize(g.adjacency().select("src", "dst"))
    spark = g.spark
    visited = materialize(
        spark.createDataFrame(
            pd.DataFrame({"s": sources}), schema="s long"
        ).select("s", F.col("s").alias("v"), F.lit(0).alias("dist"), F.lit(1.0).alias("sigma"))
    )
    frontier = visited
    for level in range(1, max_iter + 1):
        nxt = (
            frontier.join(adj, frontier.v == adj.src)
            .groupBy("s", F.col("dst").alias("v"))
            .agg(F.sum("sigma").alias("sigma"))
            .join(visited.select("s", "v"), ["s", "v"], "left_anti")
            .withColumn("dist", F.lit(level))
            .select("s", "v", "dist", "sigma")
        )
        nxt = materialize(nxt)
        if nxt.limit(1).count() == 0:
            break
        visited = materialize(visited.unionByName(nxt))
        frontier = nxt
    return visited


def brandes_delta(g: Graph, visited: DataFrame) -> DataFrame:
    """DataFrame[s, v, delta]: dependency accumulation over the BFS DAG."""
    adj = materialize(g.adjacency().select("src", "dst"))
    max_level = visited.agg(F.max("dist")).collect()[0][0] or 0
    delta = materialize(visited.select("s", "v", F.lit(0.0).alias("delta")))
    for level in range(max_level, 0, -1):
        down = (
            visited.where(F.col("dist") == level)
            .withColumnRenamed("v", "w")
            .withColumnRenamed("sigma", "sigma_w")
        )
        down = down.join(
            delta.withColumnRenamed("v", "w").withColumnRenamed("delta", "delta_w"),
            ["s", "w"],
        )
        up = (
            visited.where(F.col("dist") == level - 1)
            .withColumnRenamed("sigma", "sigma_u")
            .select("s", "v", "sigma_u")
        )
        # DAG edges: (u at level-1) -> (w at level) that are graph edges.
        contrib = (
            up.join(adj.select(F.col("src").alias("v"), F.col("dst").alias("w")), "v")
            .join(down, ["s", "w"])
            .groupBy("s", "v")
            .agg(
                F.sum(
                    (F.col("sigma_u") / F.col("sigma_w")) * (1.0 + F.col("delta_w"))
                ).alias("contrib")
            )
        )
        delta = materialize(
            delta.join(contrib, ["s", "v"], "left").select(
                "s", "v",
                (F.col("delta") + F.coalesce("contrib", F.lit(0.0))).alias("delta"),
            )
        )
    return delta


def betweenness_scores(g: Graph, *, sources: list[int]) -> DataFrame:
    """DataFrame[v, score]: sampled-source Brandes betweenness.

    Unnormalized pair-dependency sums (for undirected graphs each
    unordered pair is counted from both endpoints, like doubling Brandes'
    1/2 factor) — top-k precision only needs the ranking.
    """
    visited = bfs_sigma(g, sources)
    delta = brandes_delta(g, visited)
    scores = (
        delta.where(F.col("s") != F.col("v"))
        .groupBy("v")
        .agg(F.sum("delta").alias("score"))
    )
    return (
        g.vertices()
        .join(scores, "v", "left")
        .select("v", F.coalesce("score", F.lit(0.0)).alias("score"))
    )
