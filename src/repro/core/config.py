"""Configuration of the CEAFF pipeline.

Every ablation row of Table V is a field toggle here:

- ``use_struct`` / ``use_semantic`` / ``use_string`` — "w/o M^s / M^n / M^l";
- ``weighting='equal'`` — "w/o AFF" (fixed equal weights);
- ``weighting='lr'`` — the learning-based LR weighting baseline;
- ``theta_override=False`` — "w/o θ1, θ2";
- ``collective=False`` — "w/o C" (independent top-1 decisions);
- ``matcher='hungarian'`` — the max-weight bipartite alternative from the
  Section VI discussion.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.fusion.adaptive import THETA1_DEFAULT, THETA2_DEFAULT
from repro.structure.training import GCNConfig


@dataclass(frozen=True)
class CEAFFConfig:
    """Pipeline switches; defaults reproduce full CEAFF (paper Section VII-A:
    θ1=0.98, θ2=0.1, GCN margin γ=3; dimensions scaled per DESIGN.md)."""

    use_struct: bool = True
    use_semantic: bool = True
    use_string: bool = True
    weighting: str = "adaptive"  # "adaptive" | "equal" | "lr"
    theta_override: bool = True
    theta1: float = THETA1_DEFAULT
    theta2: float = THETA2_DEFAULT
    collective: bool = True
    matcher: str = "daa"  # "daa" | "hungarian" (used when collective)
    gcn: GCNConfig = field(default_factory=GCNConfig)
    lr_n_neg: int = 10
    lr_seed: int = 23
    use_spark: bool = True

    def label(self) -> str:
        """Short human-readable tag, e.g. for table rows."""
        missing = [
            tag
            for flag, tag in [
                (self.use_struct, "Ms"),
                (self.use_semantic, "Mn"),
                (self.use_string, "Ml"),
            ]
            if not flag
        ]
        bits = []
        if not self.collective:
            bits.append("C")
        bits.extend(missing)
        if self.weighting == "equal":
            bits.append("AFF")
        if self.weighting == "lr":
            return "LR"
        if not self.theta_override:
            bits.append("theta")
        return "CEAFF" + (" w/o " + ",".join(bits) if bits else "")
