"""Embedding substrate: skip-gram-equivalent SPPMI/SVD co-occurrence
embeddings (Spark counting) and random-walk embeddings for graph baselines."""
from repro.embed.skipgram import (
    cooccurrence_counts,
    cooccurrence_embeddings,
    sppmi_matrix,
    svd_embed,
)
from repro.embed.walks import random_walks, walk_embeddings

__all__ = [
    "cooccurrence_counts",
    "cooccurrence_embeddings",
    "sppmi_matrix",
    "svd_embed",
    "random_walks",
    "walk_embeddings",
]
