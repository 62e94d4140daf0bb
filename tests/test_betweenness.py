"""Tests for the DataFrame Brandes betweenness against exact networkx."""
import networkx as nx
import numpy as np
import pytest

from repro.metrics import betweenness
from tests.conftest import to_nx


class TestBfsSigma:
    def test_path_counts(self, tiny_undirected):
        g = tiny_undirected
        out = betweenness.bfs_sigma(g, [0]).toPandas()
        G = to_nx(g)
        # sigma via networkx: number of shortest paths from 0
        dist = nx.single_source_shortest_path_length(G, 0)
        sigma = {0: 1.0}
        for v in sorted(dist, key=dist.get):
            if v == 0:
                continue
            sigma[v] = sum(
                sigma[u] for u in G.neighbors(v) if dist[u] == dist[v] - 1
            )
        ours = {int(r.v): (r.dist, r.sigma) for r in out.itertuples()}
        for v, d in dist.items():
            assert ours[v][0] == d
            assert ours[v][1] == pytest.approx(sigma[v])


class TestBetweennessExact:
    def test_undirected_matches_networkx(self, tiny_undirected):
        g = tiny_undirected
        sc = (
            betweenness.betweenness_scores(g, sources=list(range(g.n)))
            .toPandas().sort_values("v")["score"].to_numpy()
        )
        ref_d = nx.betweenness_centrality(to_nx(g), normalized=False)
        # nx counts each unordered pair once; all-sources Brandes counts both
        ref = 2 * np.array([ref_d[i] for i in range(g.n)])
        assert np.abs(sc - ref).max() < 1e-9

    def test_directed_matches_networkx(self, tiny_directed):
        g = tiny_directed
        sc = (
            betweenness.betweenness_scores(g, sources=list(range(g.n)))
            .toPandas().sort_values("v")["score"].to_numpy()
        )
        ref_d = nx.betweenness_centrality(to_nx(g), normalized=False)
        ref = np.array([ref_d[i] for i in range(g.n)])
        assert np.abs(sc - ref).max() < 1e-9

    def test_path_graph_analytic(self, path_graph):
        """On a path, delta for middle vertices is (#left)*(#right)*2."""
        sc = (
            betweenness.betweenness_scores(path_graph, sources=list(range(10)))
            .toPandas().sort_values("v")["score"].to_numpy()
        )
        expect = np.array([2.0 * i * (9 - i) for i in range(10)])
        assert np.allclose(sc, expect)


class TestSampled:
    def test_sampled_subset_correlates(self, tiny_undirected):
        g = tiny_undirected
        full = (
            betweenness.betweenness_scores(g, sources=list(range(g.n)))
            .toPandas().sort_values("v")["score"].to_numpy()
        )
        sampled = (
            betweenness.betweenness_scores(g, sources=list(range(0, g.n, 3)))
            .toPandas().sort_values("v")["score"].to_numpy()
        )
        rho = np.corrcoef(full, sampled)[0, 1]
        assert rho > 0.9

    def test_deterministic(self, tiny_undirected):
        a = betweenness.betweenness_scores(tiny_undirected, sources=[1, 2, 3]).toPandas()
        b = betweenness.betweenness_scores(tiny_undirected, sources=[1, 2, 3]).toPandas()
        assert (
            a.sort_values("v")["score"].to_numpy()
            == b.sort_values("v")["score"].to_numpy()
        ).all()
