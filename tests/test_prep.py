"""Tests for the §3.1 preprocessing pipeline (prep.py DataFrame jobs)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.graph import Graph
from repro.graphs import prep


@pytest.fixture(scope="module")
def gappy_graph(spark):
    """Edges over sparse ids {2, 5, 9, 14}; vertices 0..19 declared."""
    pdf = pd.DataFrame({"src": [2, 5, 9], "dst": [5, 9, 14]})
    return Graph.from_pandas(spark, pdf, directed=False, weighted=False, n=20)


class TestDropIsolatedAndReindex:
    def test_vertex_count(self, gappy_graph):
        g2, old_ids = prep.drop_isolated_and_reindex(gappy_graph)
        assert g2.n == 4
        assert list(old_ids) == [2, 5, 9, 14]

    def test_ids_dense_zero_based(self, gappy_graph):
        g2, _ = prep.drop_isolated_and_reindex(gappy_graph)
        e = g2.to_pandas_edges()
        assert set(e["src"]) | set(e["dst"]) <= set(range(4))

    def test_order_preserving(self, gappy_graph):
        g2, old_ids = prep.drop_isolated_and_reindex(gappy_graph)
        # edge 2-5 must become 0-1, 5-9 -> 1-2, 9-14 -> 2-3
        pairs = set(map(tuple, g2.to_pandas_edges()[["src", "dst"]].to_numpy()))
        assert pairs == {(0, 1), (1, 2), (2, 3)}

    def test_edge_count_preserved(self, gappy_graph):
        g2, _ = prep.drop_isolated_and_reindex(gappy_graph)
        assert g2.m == gappy_graph.m

    def test_label_realignment(self, spark):
        pdf = pd.DataFrame({"src": [3, 7], "dst": [7, 9]})
        g = Graph.from_pandas(spark, pdf, directed=False, weighted=False, n=12)
        labels = np.arange(100, 112)
        g2, old_ids = prep.drop_isolated_and_reindex(g)
        realigned = labels[old_ids]
        assert list(realigned) == [103, 107, 109]

    def test_noop_when_no_isolated(self, tiny_undirected):
        g2, old_ids = prep.drop_isolated_and_reindex(tiny_undirected)
        assert g2.n == tiny_undirected.n
        assert (old_ids == np.arange(tiny_undirected.n)).all()

    def test_directed_preserved(self, spark):
        pdf = pd.DataFrame({"src": [4, 8], "dst": [8, 4]})
        g = Graph.from_pandas(spark, pdf, directed=True, weighted=False, n=10)
        g2, _ = prep.drop_isolated_and_reindex(g)
        assert g2.directed
        pairs = set(map(tuple, g2.to_pandas_edges()[["src", "dst"]].to_numpy()))
        assert pairs == {(0, 1), (1, 0)}


class TestIsolatedCount:
    def test_counts_isolated(self, gappy_graph):
        assert prep.isolated_count(gappy_graph) == 16

    def test_zero_for_dense(self, tiny_undirected):
        assert prep.isolated_count(tiny_undirected) == 0

    def test_used_vertices(self, gappy_graph):
        used = prep.used_vertices(gappy_graph).toPandas()["v"]
        assert sorted(used) == [2, 5, 9, 14]
