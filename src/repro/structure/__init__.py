"""Structural substrate: normalized adjacency built with Spark DataFrame
ops, a NumPy 2-layer GCN (shared weights across the two KGs) trained with
the paper's margin-based ranking loss (Eq. 1), and the training loop."""
from repro.structure.adjacency import adjacency_long, adjacency_dense, degrees
from repro.structure.gcn import GCNParams, gcn_forward, gcn_backward, init_params
from repro.structure.training import GCNConfig, train_gcn, structural_embeddings

__all__ = [
    "adjacency_long",
    "adjacency_dense",
    "degrees",
    "GCNParams",
    "gcn_forward",
    "gcn_backward",
    "init_params",
    "GCNConfig",
    "train_gcn",
    "structural_embeddings",
]
