"""Tests for clustering metrics: coefficients vs networkx, LPA behaviour,
clustering-F1 formula, DuckDB oracle for triangle counting."""
import networkx as nx
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.metrics import clustering, connectivity
from repro.oracle import assert_equivalent
from tests.conftest import to_nx


class TestCoefficients:
    @pytest.mark.parametrize("fixture", ["tiny_undirected", "tiny_disconnected", "sbm_graph"])
    def test_mcc_matches_networkx(self, request, fixture):
        g = request.getfixturevalue(fixture)
        if fixture == "sbm_graph":
            g = g[0]
        assert clustering.mean_clustering_coefficient(g) == pytest.approx(
            nx.average_clustering(to_nx(g)), abs=1e-9
        )

    @pytest.mark.parametrize("fixture", ["tiny_undirected", "tiny_disconnected"])
    def test_gcc_matches_networkx(self, request, fixture):
        g = request.getfixturevalue(fixture)
        assert clustering.global_clustering_coefficient(g) == pytest.approx(
            nx.transitivity(to_nx(g)), abs=1e-9
        )

    def test_lcc_per_vertex_matches_networkx(self, tiny_undirected):
        g = tiny_undirected
        lcc = clustering.local_clustering_coefficients(g).toPandas().set_index("v")["lcc"]
        ref = nx.clustering(to_nx(g))
        for v in range(g.n):
            assert lcc.loc[v] == pytest.approx(ref[v], abs=1e-9)

    def test_complete_graph_all_ones(self, complete_graph):
        assert clustering.mean_clustering_coefficient(complete_graph) == pytest.approx(1.0)
        assert clustering.global_clustering_coefficient(complete_graph) == pytest.approx(1.0)

    def test_tree_zero(self, path_graph):
        assert clustering.mean_clustering_coefficient(path_graph) == 0.0
        assert clustering.global_clustering_coefficient(path_graph) == 0.0

    def test_directed_symmetrized(self, tiny_directed):
        """Directed graphs are measured on the symmetrized view."""
        ours = clustering.mean_clustering_coefficient(tiny_directed)
        ref = nx.average_clustering(to_nx(tiny_directed).to_undirected())
        assert ours == pytest.approx(ref, abs=1e-9)

    def test_triangle_totals_match_duckdb(self, spark, tiny_undirected):
        """DuckDB oracle: total triangle count via three-way SQL join."""
        g = tiny_undirected
        vt = clustering.vertex_triangles(g).agg(
            (F.sum("triangles") / 3).cast("long").alias("n_triangles")
        )
        assert_equivalent(
            vt,
            """
            SELECT COUNT(*) AS n_triangles
            FROM edges e1 JOIN edges e2 ON e1.dst = e2.src
                 JOIN edges e3 ON e2.dst = e3.dst AND e1.src = e3.src
            """,
            edges=g.edges,
        )


class TestLPA:
    def test_labels_within_components(self, tiny_disconnected):
        g = tiny_disconnected
        lab = clustering.lpa_communities(g).toPandas().set_index("v")["label"]
        comp = connectivity.connected_components(g).toPandas().set_index("v")["comp"]
        # a label never spans two components
        spans = pd.DataFrame({"lab": lab, "comp": comp}).groupby("lab")["comp"].nunique()
        assert (spans == 1).all()

    def test_at_least_components_many(self, tiny_disconnected):
        n_comm = clustering.num_communities(tiny_disconnected)
        assert n_comm >= connectivity.num_components(tiny_disconnected)

    def test_recovers_planted_partition(self, sbm_graph):
        g, labels = sbm_graph
        lab = clustering.lpa_communities(g).toPandas().sort_values("v")["label"].to_numpy()
        # most pairs in the same planted community share an LPA label
        f1 = clustering.clustering_f1(
            clustering.labels_from_pandas(g.spark, lab),
            clustering.labels_from_pandas(g.spark, labels),
            g.n,
        )
        assert f1 > 0.6

    def test_empty_graph_singletons(self, tiny_undirected):
        h = tiny_undirected.with_edges(tiny_undirected.edges.limit(0))
        assert clustering.num_communities(h) == tiny_undirected.n

    def test_deterministic(self, tiny_undirected):
        a = clustering.lpa_communities(tiny_undirected).toPandas().sort_values("v")
        b = clustering.lpa_communities(tiny_undirected).toPandas().sort_values("v")
        assert (a["label"].to_numpy() == b["label"].to_numpy()).all()


class TestClusteringF1:
    def test_identity_is_one(self, spark):
        lab = clustering.labels_from_pandas(spark, [0, 0, 1, 1, 2, 2])
        assert clustering.clustering_f1(lab, lab, 6) == pytest.approx(1.0)

    def test_known_contingency(self, spark):
        # eval: {0,1,2},{3,4,5}; ref: {0,1},{2,3},{4,5}
        ev = clustering.labels_from_pandas(spark, [0, 0, 0, 1, 1, 1])
        rf = clustering.labels_from_pandas(spark, [0, 0, 1, 1, 2, 2])
        # per-row max: eval cluster A -> 2 (ref 0), B -> 2 (ref 2); sum=4
        # precision = 4/6, recall = 4/6, F1 = 2/3
        assert clustering.clustering_f1(ev, rf, 6) == pytest.approx(2 / 3)

    def test_label_names_irrelevant(self, spark):
        a = clustering.labels_from_pandas(spark, [0, 0, 1, 1])
        b = clustering.labels_from_pandas(spark, [7, 7, 3, 3])
        assert clustering.clustering_f1(a, b, 4) == pytest.approx(1.0)

    def test_range(self, spark):
        a = clustering.labels_from_pandas(spark, [0, 1, 2, 3])
        b = clustering.labels_from_pandas(spark, [0, 0, 0, 0])
        f1 = clustering.clustering_f1(a, b, 4)
        assert 0.0 < f1 <= 1.0
