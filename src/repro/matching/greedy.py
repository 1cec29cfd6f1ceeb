"""Independent EA decisions — the state-of-the-art default the paper argues
against (Figure 1) and its "w/o C" ablation: each source entity takes the
top-ranked target of its row, so several sources may claim one target."""
from __future__ import annotations

import numpy as np


def independent_top1(m: np.ndarray) -> np.ndarray:
    """``match[i] = argmax_j m[i, j]`` (first index wins ties)."""
    return np.argmax(m, axis=1)
