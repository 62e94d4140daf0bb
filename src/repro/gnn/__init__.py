"""GNN substrate (§2.2.5 "GNN" metric, Fig. 13).

The paper trains GraphSAGE / ClusterGCN (PyG, A40 GPU) on the sparsified
graph and tests on the full graph. No torch/GPU exists in this
container, so the substrate is a from-scratch NumPy implementation: mean
neighbor aggregation as sparse matmuls built from the edge list, manual
backprop, Adam (DESIGN.md §2). The experimental signal — which graph the
aggregation runs over — is identical.
"""
