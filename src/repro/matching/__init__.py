"""Matching layer: independent top-1 (the "w/o C" ablation), the deferred
acceptance algorithm for stable matching (the paper's collective EA), an
iterative Spark DataFrame implementation of DAA, and the max-weight
bipartite alternative (Hungarian / Jonker-Volgenant) the paper discusses."""
from repro.matching.greedy import independent_top1
from repro.matching.daa import deferred_acceptance, blocking_pairs, is_stable
from repro.matching.daa_spark import deferred_acceptance_spark
from repro.matching.hungarian import hungarian_max

__all__ = [
    "independent_top1",
    "deferred_acceptance",
    "blocking_pairs",
    "is_stable",
    "deferred_acceptance_spark",
    "hungarian_max",
]
