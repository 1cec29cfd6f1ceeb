"""Evaluation harness: metrics (accuracy / Hits@k / MRR) and one
reproduction harness per paper table (II–VI), with the paper's reported
numbers embedded next to ours for diffing."""
from repro.evalx.metrics import accuracy, hits_at_k, mrr, ranking_metrics
from repro.evalx.tables import Harness, format_rows

__all__ = [
    "accuracy",
    "hits_at_k",
    "mrr",
    "ranking_metrics",
    "Harness",
    "format_rows",
]
