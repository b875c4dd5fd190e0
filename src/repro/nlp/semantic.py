"""Semantic entity embeddings — the BERT substitute.

The paper obtains semantic-level entity embeddings E^Se from a BERT model
pretrained on zh-Wikipedia. Offline we simulate a pretrained LM with a
**deterministic hashed character-n-gram encoder**: each entity name is
decomposed into character trigrams; each trigram hashes to a fixed random
Gaussian vector; the name embedding is the L2-normalized sum.

Because synthetic entity names share their leading (topic) token within a
topic and its first syllable within a supertopic (see
``repro.world.entity_dict``), n-gram overlap makes semantically-related
entities close in this space *without* exposing the latent ground truth —
exactly the role BERT plays for Stage I candidates and contrastive anchors.

An optional ``topic_leak`` term mixes in a noisy projection of the latent
vector, modelling the fact that a real LM knows world knowledge beyond
surface form; it defaults to a small value.
"""
from __future__ import annotations

import zlib

import numpy as np

from repro.world.entity_dict import EntityWorld


def _ngrams(s: str, n: int = 3) -> list[str]:
    s = f"^{s}$"
    return [s[i : i + n] for i in range(max(1, len(s) - n + 1))]


def _hash_vec(token: str, dim: int) -> np.ndarray:
    # crc32 is stable across processes (builtin hash() is salted per-process,
    # which would make Spark-worker results nondeterministic).
    rng = np.random.default_rng(zlib.crc32(f"sem|{token}".encode()))
    return rng.normal(size=dim)


def semantic_embeddings(
    world: EntityWorld, dim: int = 32, topic_leak: float = 0.4, seed: int = 0
) -> np.ndarray:
    """(n_entities, dim) unit-norm semantic embeddings E^Se."""
    cfg = world.config
    rng = np.random.default_rng(cfg.seed + 505 + seed)
    out = np.zeros((cfg.n_entities, dim))
    for i, name in enumerate(world.name_of):
        v = np.zeros(dim)
        for word in name.split():
            for g in _ngrams(word):
                v += _hash_vec(g, dim)
        out[i] = v
    out /= np.linalg.norm(out, axis=1, keepdims=True) + 1e-12
    if topic_leak > 0:
        proj = rng.normal(size=(world.vectors.shape[1], dim)) / np.sqrt(dim)
        leak = world.vectors @ proj
        leak += 0.6 * rng.normal(size=leak.shape)
        leak /= np.linalg.norm(leak, axis=1, keepdims=True) + 1e-12
        out = (1 - topic_leak) * out + topic_leak * leak
        out /= np.linalg.norm(out, axis=1, keepdims=True) + 1e-12
    return out


def top_k_similar(emb: np.ndarray, k: int) -> tuple[np.ndarray, np.ndarray]:
    """Brute-force cosine top-k neighbors (excluding self) for each row.

    Returns (idx, sim) with shape (n, k). At world scale (<= a few thousand
    entities) a dense matmul is the right tool; the paper used an ANN index
    at millions of entities.
    """
    sims = emb @ emb.T
    np.fill_diagonal(sims, -np.inf)
    idx = np.argpartition(-sims, kth=min(k, sims.shape[1] - 1) - 1, axis=1)[:, :k]
    row = np.arange(sims.shape[0])[:, None]
    s = sims[row, idx]
    order = np.argsort(-s, axis=1)
    return idx[row, order], s[row, order]
