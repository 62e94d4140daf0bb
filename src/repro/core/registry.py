"""Catalog of sparsifiers and metrics with the paper's applicability
metadata (Tables 1 and 2).

``SPARSIFIERS`` maps short names (the paper's abbreviations) to a
:class:`SparsifierSpec` carrying the callable and the Table 2 columns;
``METRICS`` carries the Table 1 applicability rows. Jobs render these
tables straight from here, and tests verify the claims empirically
(determinism, prune-rate control, weight change).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from repro.core.graph import Graph
from repro.sparsifiers.effective_resistance import (
    er_unweighted_sparsify,
    er_weighted_sparsify,
)
from repro.sparsifiers.forest_fire import forest_fire_sparsify
from repro.sparsifiers.kneighbor import kneighbor_sparsify
from repro.sparsifiers.local_degree import local_degree_sparsify
from repro.sparsifiers.random_edge import random_sparsify
from repro.sparsifiers.rank_degree import rank_degree_sparsify
from repro.sparsifiers.similarity import (
    g_spar_sparsify,
    l_spar_sparsify,
    local_similarity_sparsify,
    scan_sparsify,
)
from repro.sparsifiers.spanner import spanner_sparsify
from repro.sparsifiers.spanning_forest import spanning_forest_sparsify


@dataclass(frozen=True)
class SparsifierSpec:
    """One Table 2 row: the algorithm plus its declared characteristics."""

    abbrev: str
    name: str
    fn: Callable[..., Graph]
    deterministic: bool
    supports_directed: bool
    prune_rate_control: str  # "fine" | "coarse" | "none"
    changes_weights: bool
    complexity: str

    def __call__(self, g: Graph, rho: float, *, seed: int = 0) -> Graph:
        return self.fn(g, rho, seed=seed)


SPARSIFIERS: dict[str, SparsifierSpec] = {
    s.abbrev: s
    for s in [
        SparsifierSpec("RN", "Random", random_sparsify, False, True, "fine", False,
                       "O(rho*|E|)"),
        SparsifierSpec("KN", "K-Neighbor", kneighbor_sparsify, False, True, "coarse",
                       False, "O(|E|)"),
        SparsifierSpec("RD", "Rank Degree", rank_degree_sparsify, False, True,
                       "coarse", False, "O(rho|E|)-O(rho|E|log(rho|E|))"),
        SparsifierSpec("LD", "Local Degree", local_degree_sparsify, True, True,
                       "coarse", False, "O(|E|)-O(|E|log|E|)"),
        SparsifierSpec("SF", "Spanning Forest", spanning_forest_sparsify, True,
                       False, "none", False, "O(|E|log|V|)"),
        SparsifierSpec("SP", "t-Spanner", spanner_sparsify, True, False, "none",
                       False, "O(|V|^2 log|V|)"),
        SparsifierSpec("FF", "Forest Fire", forest_fire_sparsify, False, True,
                       "coarse", False, "O(r|E|)"),
        SparsifierSpec("LS", "L-Spar", l_spar_sparsify, True, True, "coarse",
                       False, "O(k|E|)"),
        SparsifierSpec("GS", "G-Spar", g_spar_sparsify, True, True, "fine", False,
                       "O(k|E|)"),
        SparsifierSpec("LSim", "Local Similarity", local_similarity_sparsify, True,
                       True, "coarse", False, "O(|E|)"),
        SparsifierSpec("SCAN", "SCAN", scan_sparsify, True, True, "fine", False,
                       "O(|E|)"),
        SparsifierSpec("ERw", "ER-weighted", er_weighted_sparsify, False, False,
                       "fine", True, "O(|E|log(|V|)^3)"),
        SparsifierSpec("ERu", "ER-unweighted", er_unweighted_sparsify, False,
                       False, "fine", False, "O(|E|log(|V|)^3)"),
    ]
}

# The 12 algorithm families of the paper (ERw/ERu are the two §3.2
# variants of the single ER algorithm).
FAMILY_COUNT = 12


@dataclass(frozen=True)
class MetricSpec:
    """One Table 1 row: metric applicability to graph types."""

    name: str
    directed: bool  # usable on directed graphs
    weighted: bool  # uses weights (False = "weight not used")
    unconnected: bool  # usable on unconnected graphs
    note: str = ""


METRICS: list[MetricSpec] = [
    MetricSpec("Degree Dist.", True, False, True),
    MetricSpec("Diameter", True, True, True, "unreachable pairs excluded"),
    MetricSpec("Eccentricity", True, True, True, "unreachable pairs excluded"),
    MetricSpec("APSP", True, True, True, "unreachable pairs excluded"),
    MetricSpec("Betweenness Cent.", True, True, True),
    MetricSpec("Closeness Cent.", True, True, True),
    MetricSpec("Eigenvector Cent.", True, True, True, "left eigenvector when directed"),
    MetricSpec("Katz Cent.", True, True, True),
    MetricSpec("#Communities", False, True, True),
    MetricSpec("LCC", True, False, True),
    MetricSpec("MCC", True, False, True),
    MetricSpec("GCC", True, False, True),
    MetricSpec("Clustering F1 Sim", False, True, True),
    MetricSpec("PageRank", True, True, True),
    MetricSpec("Min-cut/Max-flow", True, True, True, "cross-community pairs excluded"),
    MetricSpec("GNN", True, True, True),
]
