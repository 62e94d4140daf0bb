"""The 12 sparsification algorithms of the paper (§2.3).

Every sparsifier is a pure function ``f(g: Graph, rho: float, *, seed)``
returning a new :class:`repro.core.graph.Graph` over a subset of edges,
with ``|E'| ≈ (1 - rho)|E|`` wherever the algorithm allows prune-rate
control (Table 2). See :mod:`repro.core.registry` for the catalog.
"""
