"""Competitor proxies for the paper's 11 baselines (Tables III/IV/VI).

Re-implementing eleven neural EA systems verbatim is out of scope; instead
each paper baseline maps to a real trained representative of its mechanism
class (translational embedding with/without shared space, bootstrapping,
path augmentation; GCN variants; name-aware outcome fusion) — see
``repro.baselines.proxies`` and DESIGN.md section 2 for the mapping."""
from repro.baselines.transe import TransEConfig, transe_similarity
from repro.baselines.proxies import BASELINES, STRUCTURE_ONLY, MULTI_FEATURE, run_baseline

__all__ = [
    "TransEConfig",
    "transe_similarity",
    "BASELINES",
    "STRUCTURE_ONLY",
    "MULTI_FEATURE",
    "run_baseline",
]
