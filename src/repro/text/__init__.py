"""Textual substrate: tokenization, synthetic word embeddings, and the
Spark dataflow that turns entity names into averaged-word-embedding
vectors (the paper's semantic feature, Section IV-B)."""
from repro.text.tokenize import tokens
from repro.text.embeddings import embedding_dim, emb_long_format, name_vectors_numpy
from repro.text.name_embedding import name_vectors_spark, name_vectors_long

__all__ = [
    "tokens",
    "embedding_dim",
    "emb_long_format",
    "name_vectors_numpy",
    "name_vectors_spark",
    "name_vectors_long",
]
