"""Laplacian quadratic form preservation (§2.2.1, §3.3.1).

For an undirected graph, ``x^T L x = sum_e w_e (x_u - x_v)^2`` — an
edge-local sum, so it is computed as a DataFrame join of the edge list
with a (vertex, vector-index, value) table of random test vectors. The
reported statistic is the mean over ``k`` random vectors of the ratio
``x^T L_sparse x / x^T L x`` (closer to 1 is better; ER-weighted is the
only sparsifier designed to keep it there).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.graph import Graph


def random_vectors(n: int, k: int, *, seed: int = 0) -> pd.DataFrame:
    """Long-format (v, vec, x) table of k random N(0,1) test vectors."""
    rng = np.random.default_rng(seed)
    x = rng.standard_normal((n, k))
    return pd.DataFrame(
        {
            "v": np.repeat(np.arange(n, dtype=np.int64), k),
            "vec": np.tile(np.arange(k, dtype=np.int64), n),
            "x": x.ravel(),
        }
    )


def quadratic_forms(g: Graph, vectors: pd.DataFrame) -> DataFrame:
    """DataFrame[vec, qf] with ``qf = x_vec^T L x_vec`` per test vector."""
    gu = g.symmetrized()
    vec_df = g.spark.createDataFrame(vectors, schema="v long, vec long, x double")
    xu = vec_df.select(F.col("v").alias("src"), "vec", F.col("x").alias("xu"))
    xv = vec_df.select(F.col("v").alias("dst"), "vec", F.col("x").alias("xv"))
    return (
        gu.edges.join(xu, "src")
        .join(xv, ["dst", "vec"])
        .groupBy("vec")
        .agg(
            F.sum(F.col("weight") * (F.col("xu") - F.col("xv")) ** 2).alias("qf")
        )
    )


def quadratic_form_ratio(
    orig: Graph, sparse: Graph, *, k_vectors: int = 100, seed: int = 0
) -> float:
    """Mean over random vectors of x^T L_sparse x / x^T L_orig x."""
    vectors = random_vectors(orig.n, k_vectors, seed=seed)
    a = quadratic_forms(orig, vectors).withColumnRenamed("qf", "qf_orig")
    b = quadratic_forms(sparse, vectors).withColumnRenamed("qf", "qf_sparse")
    pdf = a.join(b, "vec").toPandas()
    ratios = pdf["qf_sparse"] / pdf["qf_orig"]
    return float(ratios.mean())
