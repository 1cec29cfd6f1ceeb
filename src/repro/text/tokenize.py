"""Entity-name tokenization.

Names produced by :mod:`repro.kgdata.generator` are space-separated surface
words; real DBpedia-style labels are also whitespace-separated after
underscore cleanup. We therefore tokenize on runs of whitespace and drop
empties — deliberately the same rule as Spark's ``split(name, ' ')`` with a
null filter, so the Spark and driver-side paths agree token-for-token.
"""
from __future__ import annotations


def tokens(name: str) -> list[str]:
    """Whitespace tokens of an entity name, empties dropped."""
    return [t for t in name.split() if t]
