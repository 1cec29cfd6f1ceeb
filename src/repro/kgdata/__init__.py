"""Synthetic KG-pair benchmark substrate.

The paper evaluates on DBP15K / DBP100K / SRPRS (DBpedia, Wikidata, YAGO3
extracts), which are unavailable offline. This package generates parametric
two-view KG pairs from a latent "world" graph so that the three CEAFF
features (structural / semantic / string) have independently controllable
signal strength. See DESIGN.md section 2 for the substitution rationale.
"""
from repro.kgdata.model import KG, KGPair
from repro.kgdata.generator import (
    KGPairSpec,
    LanguageProfile,
    StructureProfile,
    generate_pair,
)
from repro.kgdata.benchmarks import BENCHMARKS, dataset

__all__ = [
    "KG",
    "KGPair",
    "KGPairSpec",
    "LanguageProfile",
    "StructureProfile",
    "generate_pair",
    "BENCHMARKS",
    "dataset",
]
