"""Tests for connectivity metrics against networkx and closed forms."""
import networkx as nx
import pytest

from repro.metrics import connectivity
from tests.conftest import to_nx


class TestConnectedComponents:
    @pytest.mark.parametrize("fixture", ["tiny_undirected", "tiny_disconnected", "path_graph"])
    def test_component_count_matches_nx(self, request, fixture):
        g = request.getfixturevalue(fixture)
        G = to_nx(g)
        assert connectivity.num_components(g) == nx.number_connected_components(G)

    def test_labels_partition_matches_nx(self, tiny_disconnected):
        g = tiny_disconnected
        labels = connectivity.connected_components(g).toPandas().set_index("v")["comp"]
        G = to_nx(g)
        for comp in nx.connected_components(G):
            assert len({labels.loc[v] for v in comp}) == 1
        assert labels.nunique() == nx.number_connected_components(G)

    def test_directed_weak_components(self, tiny_directed):
        g = tiny_directed
        G = to_nx(g)
        assert connectivity.num_components(g) == nx.number_weakly_connected_components(G)

    def test_is_connected(self, tiny_undirected, tiny_disconnected):
        assert connectivity.is_connected(tiny_undirected)
        assert not connectivity.is_connected(tiny_disconnected)


class TestUnreachableRatio:
    def test_zero_for_connected(self, tiny_undirected):
        assert connectivity.unreachable_ratio(tiny_undirected) == 0.0

    def test_closed_form(self, tiny_disconnected):
        g = tiny_disconnected
        G = to_nx(g)
        sizes = [len(c) for c in nx.connected_components(G)]
        reach = sum(s * (s - 1) // 2 for s in sizes)
        total = g.n * (g.n - 1) // 2
        expect = 1 - reach / total
        assert connectivity.unreachable_ratio(g) == pytest.approx(expect)

    def test_empty_graph_fully_unreachable(self, tiny_undirected):
        h = tiny_undirected.with_edges(tiny_undirected.edges.limit(0))
        assert connectivity.unreachable_ratio(h) == pytest.approx(1.0)


class TestIsolatedRatio:
    def test_zero_when_all_used(self, tiny_undirected):
        assert connectivity.isolated_ratio(tiny_undirected) == 0.0

    def test_counts_vertices_without_edges(self, tiny_undirected):
        h = tiny_undirected.with_edges(tiny_undirected.edges.limit(1))
        # one edge uses exactly 2 vertices
        expect = 1 - 2 / tiny_undirected.n
        assert connectivity.isolated_ratio(h) == pytest.approx(expect)

    def test_one_for_empty(self, tiny_undirected):
        h = tiny_undirected.with_edges(tiny_undirected.edges.limit(0))
        assert connectivity.isolated_ratio(h) == pytest.approx(1.0)
