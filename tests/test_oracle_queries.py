"""DuckDB-oracle checks for the relational building blocks of the
pipeline: every query-shaped DataFrame result is validated against the
same SQL on DuckDB (wrong joins/aggregations fail loudly, not silently).
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.sparsifiers.similarity import edge_scores


class TestAdjacencyQueries:
    def test_edge_count_by_src(self, spark, tiny_directed):
        g = tiny_directed
        got = g.edges.groupBy("src").agg(F.count("*").alias("c"))
        assert_equivalent(
            got, "SELECT src, COUNT(*) AS c FROM edges GROUP BY src", edges=g.edges
        )

    def test_weight_sums(self, spark, tiny_weighted):
        g = tiny_weighted
        got = g.edges.groupBy("src").agg(F.round(F.sum("weight"), 6).alias("w"))
        assert_equivalent(
            got,
            "SELECT src, ROUND(SUM(weight), 6) AS w FROM edges GROUP BY src",
            edges=g.edges,
        )

    def test_two_hop_counts(self, spark, tiny_directed):
        """Directed 2-hop path counts via self-join."""
        g = tiny_directed
        a = g.edges.select(F.col("src").alias("a"), F.col("dst").alias("b"))
        b = g.edges.select(F.col("src").alias("b"), F.col("dst").alias("c"))
        got = a.join(b, "b").groupBy("a").agg(F.count("*").alias("paths"))
        assert_equivalent(
            got,
            """
            SELECT e1.src AS a, COUNT(*) AS paths
            FROM edges e1 JOIN edges e2 ON e1.dst = e2.src
            GROUP BY e1.src
            """,
            edges=g.edges,
        )

    def test_top_k_edges_by_weight(self, spark, tiny_weighted):
        g = tiny_weighted
        got = g.edges.orderBy(F.col("weight").desc(), "src", "dst").limit(10)
        assert_equivalent(
            got,
            "SELECT * FROM edges ORDER BY weight DESC, src, dst LIMIT 10",
            edges=g.edges,
        )


class TestSimilarityOracle:
    def test_jaccard_sql(self, spark, tiny_undirected):
        """Full Jaccard pipeline vs a DuckDB CTE over the same edges."""
        g = tiny_undirected
        got = edge_scores(g).select(
            F.col("src").alias("u"), F.col("dst").alias("v"),
            F.round("jaccard", 6).alias("j"),
        )
        assert_equivalent(
            got,
            """
            WITH adj AS (
              SELECT src AS a, dst AS b FROM edges
              UNION ALL SELECT dst, src FROM edges
            ), deg AS (
              SELECT a AS v, COUNT(*) AS d FROM adj GROUP BY a
            ), cn AS (
              SELECT a1.a AS u, a2.a AS v, COUNT(*) AS c
              FROM adj a1 JOIN adj a2 ON a1.b = a2.b AND a1.a <> a2.a
              GROUP BY a1.a, a2.a
            )
            SELECT e.src AS u, e.dst AS v,
                   ROUND(COALESCE(cn.c, 0) * 1.0 /
                         GREATEST(du.d + dv.d - COALESCE(cn.c, 0), 1), 6) AS j
            FROM edges e
            LEFT JOIN cn ON cn.u = e.src AND cn.v = e.dst
            JOIN deg du ON du.v = e.src
            JOIN deg dv ON dv.v = e.dst
            """,
            edges=g.edges,
        )

    def test_degree_histogram_sql(self, spark, tiny_undirected):
        g = tiny_undirected
        got = (
            g.degrees(include_zero=True)
            .groupBy("degree")
            .agg(F.count("*").alias("freq"))
        )
        assert_equivalent(
            got,
            """
            WITH adj AS (
              SELECT src AS v FROM edges UNION ALL SELECT dst FROM edges
            ), deg AS (
              SELECT verts.v, COALESCE(d.c, 0) AS degree
              FROM verts LEFT JOIN (SELECT v, COUNT(*) AS c FROM adj GROUP BY v) d
              USING (v)
            )
            SELECT degree, COUNT(*) AS freq FROM deg GROUP BY degree
            """,
            edges=g.edges,
            verts=g.vertices(),
        )
