"""Core of the reproduction: the evaluation framework.

The paper's primary contribution is an N-to-N evaluation harness running
12 sparsifiers against 16 graph metrics over 14 graphs. This package holds
the graph abstraction (`graph`), the iterative-DataFrame helper
(`iterate`), the sparsifier/metric registries with the applicability
metadata behind the paper's Tables 1 and 2 (`registry`), the sweep driver
(`experiment`), and table rendering for the jobs (`tables`).
"""
from repro.core.graph import Graph  # noqa: F401
