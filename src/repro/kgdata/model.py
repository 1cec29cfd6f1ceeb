"""Data model for a pair of knowledge graphs with reference alignment.

Entities are dense integer ids local to each KG (0..n_entities-1). The core
representation is pandas (generation is driver-side and deterministic); Spark
views are created on demand so feature modules can run DataFrame dataflows
over the same data the oracle sees.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass
class KG:
    """One knowledge graph: triples over local entity ids, plus entity names.

    ``triples`` columns: ``h``, ``r``, ``t`` (int64).
    ``names`` columns: ``id`` (int64), ``name`` (str, whitespace-tokenizable).
    ``lang`` is the language-profile name used to render the entity names.
    """

    triples: pd.DataFrame
    names: pd.DataFrame
    lang: str

    @property
    def n_entities(self) -> int:
        return len(self.names)

    @property
    def n_triples(self) -> int:
        return len(self.triples)

    def spark_triples(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.triples)

    def spark_names(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.names)


@dataclass
class KGPair:
    """A source/target KG pair with gold alignment and a seed/test split.

    ``links`` is the full gold standard (columns ``e1``, ``e2``; local ids in
    ``kg1``/``kg2``). ``train`` (the seed pairs S) and ``test`` partition
    ``links``. ``emb1``/``emb2`` are per-language word-embedding tables
    (columns ``token``, ``vector`` = list[float]) simulating pretrained
    multilingual embeddings — see ``repro.text.embeddings``.
    """

    name: str
    kg1: KG
    kg2: KG
    links: pd.DataFrame
    train: pd.DataFrame
    test: pd.DataFrame
    emb1: pd.DataFrame
    emb2: pd.DataFrame
    meta: dict = field(default_factory=dict)

    @property
    def n_pairs(self) -> int:
        return len(self.links)

    def test_sources(self) -> list[int]:
        """Source-KG ids of test entities (the entities to be aligned)."""
        return self.test["e1"].tolist()

    def test_targets(self) -> list[int]:
        """Target-KG ids of test entities (the candidate space, per the
        standard EA evaluation protocol: rank among test-set targets)."""
        return self.test["e2"].tolist()

    def gold(self) -> dict[int, int]:
        """Gold mapping e1 -> e2 over the test split."""
        return dict(zip(self.test["e1"], self.test["e2"]))

    def spark_train(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.train)

    def spark_test(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.test)

    def stats(self) -> dict:
        """Table II-style statistics for this pair."""
        return {
            "dataset": self.name,
            "kg1_lang": self.kg1.lang,
            "kg2_lang": self.kg2.lang,
            "kg1_triples": self.kg1.n_triples,
            "kg2_triples": self.kg2.n_triples,
            "kg1_entities": self.kg1.n_entities,
            "kg2_entities": self.kg2.n_entities,
            "n_links": self.n_pairs,
            "n_seed": len(self.train),
            "n_test": len(self.test),
        }
