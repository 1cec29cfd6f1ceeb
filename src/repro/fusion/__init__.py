"""The paper's core fusion layer: confident-correspondence mining,
adaptive weight assignment (Section V), the two-stage fusion of
(semantic, string) → textual → (+ structural) → final matrix, and the
learning-based (logistic regression) weighting baseline from Section VII-E."""
from repro.fusion.confident import confident_pairs, confident_pairs_spark
from repro.fusion.adaptive import (
    adaptive_weights,
    fuse,
    two_stage_fuse,
    FusionReport,
)
from repro.fusion.learned import lr_weights

__all__ = [
    "confident_pairs",
    "confident_pairs_spark",
    "adaptive_weights",
    "fuse",
    "two_stage_fuse",
    "FusionReport",
    "lr_weights",
]
