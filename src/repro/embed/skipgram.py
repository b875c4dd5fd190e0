"""Skip-gram-equivalent co-occurrence embeddings.

The paper trains word2vec skip-gram (SGNS) over user entity sequences to get
co-occurrence embeddings E^Co. Levy & Goldberg (NeurIPS 2014) showed SGNS
implicitly factorizes the shifted-positive-PMI (SPPMI) matrix, so we compute
the exact factorization instead of stochastic training:

1. **window co-occurrence counting** runs as distributed Spark dataflow —
   posexplode each (user, week) sequence, self-join within the window;
2. the SPPMI matrix and its truncated SVD run on the driver (the entity
   vocabulary is small at our scale factors; the paper's scale would shard
   this the same way its parameter server does).

This keeps the heavyweight part (counting over tens of millions of tokens)
in Spark while making the "model" deterministic.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def cooccurrence_counts(sequences: DataFrame, window: int = 5) -> DataFrame:
    """Windowed co-occurrence counts from ``(user_id, week, entity_seq)``.

    Returns ``(a, b, cnt)`` with a < pairs in both orders collapsed to
    unordered (a <= b handled by emitting one direction; PMI symmetrizes
    later). Pure DataFrame self-join: positions j in (i, i+window].
    """
    tokens = sequences.select(
        "user_id",
        "week",
        F.posexplode("entity_seq").alias("pos", "entity"),
    )
    a = tokens.alias("a")
    b = tokens.alias("b")
    pairs = a.join(
        b,
        on=[
            F.col("a.user_id") == F.col("b.user_id"),
            F.col("a.week") == F.col("b.week"),
            F.col("b.pos") > F.col("a.pos"),
            F.col("b.pos") <= F.col("a.pos") + F.lit(window),
        ],
    ).select(F.col("a.entity").alias("a"), F.col("b.entity").alias("b"))
    return pairs.groupBy("a", "b").agg(F.count(F.lit(1)).alias("cnt"))


def sppmi_matrix(
    counts: pd.DataFrame, n: int, shift: float = 1.0, symmetric: bool = True
) -> np.ndarray:
    """Dense SPPMI matrix from a (a, b, cnt) count frame.

    ``shift`` is log(k) for SGNS-with-k-negatives equivalence (k = e^shift).
    """
    M = np.zeros((n, n))
    M[counts["a"].to_numpy(), counts["b"].to_numpy()] = counts["cnt"].to_numpy()
    if symmetric:
        M = M + M.T
    total = M.sum()
    if total == 0:
        return M
    row = M.sum(axis=1, keepdims=True)
    col = M.sum(axis=0, keepdims=True)
    with np.errstate(divide="ignore", invalid="ignore"):
        pmi = np.log(M * total / (row @ col))
    pmi[~np.isfinite(pmi)] = -np.inf
    return np.maximum(pmi - shift, 0.0)


def svd_embed(sppmi: np.ndarray, dim: int) -> np.ndarray:
    """Truncated symmetric SVD embedding  U_d * sqrt(S_d), L2-normalized.

    Rows with no co-occurrence mass (all-zero) get a zero embedding rather
    than NaN so downstream concatenation stays finite.
    """
    u, s, _ = np.linalg.svd(sppmi, full_matrices=False)
    emb = u[:, :dim] * np.sqrt(s[:dim])[None, :]
    norms = np.linalg.norm(emb, axis=1, keepdims=True)
    return np.where(norms > 1e-12, emb / np.maximum(norms, 1e-12), 0.0)


def cooccurrence_embeddings(
    sequences: DataFrame, n_entities: int, dim: int = 32, window: int = 5, shift: float = 1.0
) -> tuple[np.ndarray, pd.DataFrame]:
    """E^Co for the whole vocabulary + the raw count frame (for candidates)."""
    counts = cooccurrence_counts(sequences, window=window).toPandas()
    sppmi = sppmi_matrix(counts, n_entities, shift=shift)
    return svd_embed(sppmi, dim), counts
