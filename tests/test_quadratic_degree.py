"""Tests for the Laplacian quadratic form and degree-distribution metrics."""
import numpy as np
import pytest

from repro.core.registry import SPARSIFIERS
from repro.metrics import degree, quadratic


class TestQuadraticForm:
    def test_matches_dense_laplacian(self, tiny_weighted):
        g = tiny_weighted
        vecs = quadratic.random_vectors(g.n, 5, seed=1)
        ours = quadratic.quadratic_forms(g, vecs).toPandas().set_index("vec")["qf"]
        # dense reference
        L = np.zeros((g.n, g.n))
        for r in g.to_pandas_edges().itertuples():
            L[r.src, r.dst] -= r.weight
            L[r.dst, r.src] -= r.weight
            L[r.src, r.src] += r.weight
            L[r.dst, r.dst] += r.weight
        X = vecs.pivot(index="v", columns="vec", values="x").to_numpy()
        for k in range(5):
            assert ours.loc[k] == pytest.approx(X[:, k] @ L @ X[:, k], rel=1e-9)

    def test_ratio_identity(self, tiny_undirected):
        r = quadratic.quadratic_form_ratio(
            tiny_undirected, tiny_undirected, k_vectors=10, seed=0
        )
        assert r == pytest.approx(1.0)

    def test_er_weighted_preserves(self, tiny_undirected):
        """The Spielman-Srivastava estimator keeps the ratio near 1."""
        h = SPARSIFIERS["ERw"](tiny_undirected, 0.5, seed=0)
        r = quadratic.quadratic_form_ratio(tiny_undirected, h, k_vectors=30, seed=0)
        assert abs(r - 1.0) < 0.35

    def test_random_does_not_preserve(self, tiny_undirected):
        h = SPARSIFIERS["RN"](tiny_undirected, 0.5, seed=0)
        r = quadratic.quadratic_form_ratio(tiny_undirected, h, k_vectors=20, seed=0)
        assert r < 0.75  # roughly rho of the mass is gone

    def test_random_vectors_deterministic(self):
        a = quadratic.random_vectors(10, 3, seed=5)
        b = quadratic.random_vectors(10, 3, seed=5)
        assert (a.to_numpy() == b.to_numpy()).all()


class TestDegreeDistribution:
    def test_histogram_sums_to_one(self):
        h = degree.histogram(np.array([1, 2, 2, 3, 10]), bins=100)
        assert h.sum() == pytest.approx(1.0)

    def test_bhattacharyya_identity_zero(self):
        p = degree.histogram(np.array([1, 2, 3, 4]), bins=10)
        assert degree.bhattacharyya(p, p) == pytest.approx(0.0, abs=1e-12)

    def test_bhattacharyya_symmetric(self):
        p = degree.histogram(np.array([1, 1, 2]), bins=10)
        q = degree.histogram(np.array([2, 3, 3]), bins=10)
        assert degree.bhattacharyya(p, q) == pytest.approx(degree.bhattacharyya(q, p))

    def test_bhattacharyya_disjoint_large(self):
        p = np.array([1.0, 0.0])
        q = np.array([0.0, 1.0])
        assert degree.bhattacharyya(p, q) > 100

    def test_distance_identity(self, tiny_undirected):
        assert degree.degree_distribution_distance(
            tiny_undirected, tiny_undirected
        ) == pytest.approx(0.0, abs=1e-12)

    def test_random_beats_local_degree(self, tiny_undirected):
        """The Fig 2 headline: uniform sampling preserves the shape better
        than degree-biased selection."""
        g = tiny_undirected
        rn = SPARSIFIERS["RN"](g, 0.6, seed=0)
        ld = SPARSIFIERS["LD"](g, 0.6, seed=0)
        assert degree.degree_distribution_distance(g, rn) < (
            degree.degree_distribution_distance(g, ld)
        )

    def test_degree_counts_include_isolated(self, tiny_undirected):
        h = tiny_undirected.with_edges(tiny_undirected.edges.limit(1))
        counts = degree.degree_counts(h)
        assert len(counts) == tiny_undirected.n
        assert (counts == 0).sum() == tiny_undirected.n - 2
