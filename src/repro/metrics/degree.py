"""Degree distribution preservation (§2.2.1, §3.3.1).

The sparsified graph's degree distribution is compared to the original's
with the Bhattacharyya distance over a shared 100-bin histogram: bins
are fixed by the *original* graph's degree range so both distributions
are discretized identically (paper: "evenly divide the discrete degree
distribution into 100 bins for all graphs").
"""
from __future__ import annotations

import numpy as np

from repro.core.graph import Graph


def degree_counts(g: Graph) -> np.ndarray:
    """Array of per-vertex degrees (out-degree for directed), incl. zeros."""
    pdf = g.degrees(include_zero=True).toPandas()
    return pdf.sort_values("v")["degree"].to_numpy(np.int64)


def histogram(degrees: np.ndarray, *, bins: int, max_degree: int | None = None) -> np.ndarray:
    """Probability histogram over ``bins`` equal-width bins on [0, max].

    ``max_degree`` defaults to the distribution's own maximum: the paper
    bins every graph's degree distribution into 100 equal bins, which
    normalizes the *shape* — uniform thinning (Random) then maps the
    distribution onto itself, while degree-biased sparsifiers distort it.
    """
    if max_degree is None:
        max_degree = int(degrees.max()) if len(degrees) else 1
    edges = np.linspace(0, max(max_degree, 1), bins + 1)
    h, _ = np.histogram(np.clip(degrees, 0, max_degree), bins=edges)
    total = h.sum()
    return h / total if total else h.astype(float)


def bhattacharyya(p: np.ndarray, q: np.ndarray) -> float:
    """B_d(P, Q) = -ln(sum_x sqrt(P(x) Q(x))); 0 means identical."""
    bc = float(np.sum(np.sqrt(p * q)))
    return float(-np.log(max(bc, 1e-300)))


def degree_distribution_distance(orig: Graph, sparse: Graph, *, bins: int = 100) -> float:
    """Bhattacharyya distance between degree-distribution shapes
    (each histogram over its own degree range; lower = better)."""
    p = histogram(degree_counts(orig), bins=bins)
    q = histogram(degree_counts(sparse), bins=bins)
    return bhattacharyya(p, q)
