"""The 16 graph metrics of the paper (§2.2) and their §3.3 estimators.

Parallel metrics are level-synchronous DataFrame jobs; inherently
sequential ones (max-flow) run on the driver over collected edge lists
(DESIGN.md §2). Every sampled estimator takes explicit sources/seed so
original and sparsified graphs are measured with identical samples.
"""
