"""Rank Degree sparsifier (RD, §2.3.3): iterative seed expansion.

Start from random seed vertices; each seed contributes its edges to the
``top_k`` highest-degree neighbors; newly touched vertices become the
next round's seeds. Repeat until the edge budget is met (re-seeding with
fresh random vertices if the frontier dries up; topping up with random
unselected edges if even re-seeding cannot reach the budget, which
happens once every vertex's top-``top_k`` edges are taken).

Level-synchronous DataFrame loop: each round is one join with the
degree-annotated adjacency plus a window rank; state is localCheckpointed
every round.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.core.iterate import materialize
from repro.sparsifiers.base import take_k, target_edges


def rank_degree_sparsify(
    g: Graph,
    rho: float,
    *,
    seed: int = 0,
    top_k: int = 3,
    seed_fraction: float = 0.05,
    max_iter: int = 60,
) -> Graph:
    """Iterative seed expansion keeping edges to top-degree neighbors."""
    k_target = target_edges(g.m, rho)
    spark = g.spark
    deg_of_dst = (
        g.degrees(include_zero=False)
        .withColumnRenamed("v", "dst")
        .withColumnRenamed("degree", "nbr_deg")
    )
    adj = materialize(
        g.adjacency().join(deg_of_dst, "dst").select("src", "dst", "weight", "nbr_deg")
    )

    def canonical(e: DataFrame) -> DataFrame:
        if g.directed:
            return e.select("src", "dst", "weight")
        return e.select(
            F.least("src", "dst").alias("src"),
            F.greatest("src", "dst").alias("dst"),
            "weight",
        ).distinct()

    def random_seeds(it: int) -> DataFrame:
        frac = min(1.0, max(seed_fraction, 8.0 / max(g.n, 1)))
        return materialize(
            g.vertices()
            .withColumn("_r", F.rand(seed * 1000 + it))
            .where(F.col("_r") < frac)
            .select(F.col("v").alias("src"))
        )

    selected = materialize(
        spark.createDataFrame([], "src long, dst long, weight double")
    )
    seeds = random_seeds(0)
    n_selected = 0
    reseeded_dry = False
    for it in range(max_iter):
        w_rank = Window.partitionBy("src").orderBy(
            F.col("nbr_deg").desc(), F.col("dst")
        )
        cand = (
            adj.join(seeds, "src")
            .withColumn("rank", F.row_number().over(w_rank))
            .where(F.col("rank") <= top_k)
        )
        new_edges = materialize(
            canonical(cand).join(selected, ["src", "dst"], "left_anti")
        )
        n_new = new_edges.count()
        if n_new == 0:
            if reseeded_dry:
                break  # even fresh seeds add nothing: top-k edges saturated
            seeds = random_seeds(it + 1)
            reseeded_dry = True
            continue
        reseeded_dry = False
        if n_selected + n_new > k_target:
            new_edges = take_k(
                new_edges.withColumn("_r", F.rand(seed * 77 + it)),
                k_target - n_selected,
                [F.col("_r"), "src", "dst"],
            )
            n_new = k_target - n_selected
        selected = materialize(selected.unionByName(new_edges))
        n_selected += n_new
        if n_selected >= k_target:
            break
        # Newly reached vertices drive the next round.
        seeds = materialize(
            new_edges.select(F.col("dst").alias("src"))
            .unionByName(new_edges.select(F.col("src").alias("src")))
            .distinct()
        )
    if n_selected < k_target:
        filler = take_k(
            g.edges.join(selected, ["src", "dst"], "left_anti").withColumn(
                "_r", F.rand(seed * 13 + 7)
            ),
            k_target - n_selected,
            [F.col("_r"), "src", "dst"],
        )
        selected = materialize(selected.unionByName(filler))
    return g.with_edges(selected, name=f"{g.name}|RD@{rho:.2f}")
