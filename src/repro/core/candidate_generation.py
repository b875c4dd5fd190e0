"""TRMP Stage I — candidate generation (Fig. 4a of the paper).

Generates the initial candidate entity graph G^C from two signals:

* **co-occurrence**: skip-gram-equivalent embeddings E^Co over the weekly
  user entity sequences (window co-occurrence counted in Spark, SPPMI/SVD
  factorization — see :mod:`repro.embed.skipgram`); candidate edges are
  entity pairs with positive shifted PMI (popularity-driven co-occurrence
  of unrelated head entities is PMI-filtered out) and count >= ``min_count``;
* **semantic**: BERT-substitute embeddings E^Se
  (:mod:`repro.nlp.semantic`); candidate edges are top-``k_semantic``
  cosine neighbors per entity.

Both edge families are kept with a relation type (0 = co-occurrence,
1 = semantic) so relational models (CompGCN) can distinguish them, and both
embedding matrices are returned — they become node features in the ranking
stage, per Eq. 1 of the paper.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.embed.skipgram import cooccurrence_counts, sppmi_matrix, svd_embed
from repro.nlp.semantic import semantic_embeddings, top_k_similar
from repro.nn.graph import EdgeGraph, symmetrize
from repro.world.entity_dict import EntityWorld

ETYPE_COOC = 0
ETYPE_SEMANTIC = 1


@dataclass
class CandidateResult:
    """Stage-I output: candidate graph + feature matrices."""

    graph: EdgeGraph  # symmetrized candidate graph with etype
    edges: pd.DataFrame  # (src, dst, etype) one row per undirected edge
    e_co: np.ndarray  # (n, d) co-occurrence embeddings  E^Co
    e_se: np.ndarray  # (n, d) semantic embeddings       E^Se

    @property
    def features(self) -> np.ndarray:
        """Node features [e^Se || e^Co] (Eq. 1)."""
        return np.concatenate([self.e_se, self.e_co], axis=1)


def generate_candidates(
    sequences: DataFrame,
    world: EntityWorld,
    dim: int = 32,
    window: int = 5,
    min_count: int = 2,
    pmi_shift: float = float(np.log(3.0)),
    k_semantic: int = 8,
    semantic_tau: float = 0.55,
) -> CandidateResult:
    """Run Stage I over the given entity sequences.

    ``sequences`` is the extractor output (user_id, week, entity_seq); pass
    a single week's slice for weekly snapshots or all weeks for Dataset-M.
    """
    n = world.config.n_entities
    counts = cooccurrence_counts(sequences, window=window).toPandas()
    e_co = svd_embed(sppmi_matrix(counts, n, shift=1.0), dim)
    e_se = semantic_embeddings(world, dim=dim)

    # --- co-occurrence candidates: SPPMI > 0 at ``pmi_shift`` AND raw
    # symmetric count >= min_count (PMI kills popularity co-occurrence,
    # min_count kills one-off noise)
    sppmi_cand = sppmi_matrix(counts, n, shift=pmi_shift)
    csym = np.zeros((n, n))
    csym[counts["a"].to_numpy(), counts["b"].to_numpy()] = counts["cnt"].to_numpy()
    csym = csym + csym.T
    cs, cd = np.where((np.triu(sppmi_cand, 1) > 0) & (np.triu(csym, 1) >= min_count))
    cooc_edges = np.stack([cs, cd], axis=1) if len(cs) else np.empty((0, 2), dtype=np.int64)

    # --- semantic candidates: top-k cosine neighbors above tau
    idx, simv = top_k_similar(e_se, k_semantic)
    srcs = np.repeat(np.arange(n), k_semantic)
    dsts = idx.reshape(-1)
    keep = simv.reshape(-1) > semantic_tau
    sem_src, sem_dst = srcs[keep], dsts[keep]
    sem_lo = np.minimum(sem_src, sem_dst)
    sem_hi = np.maximum(sem_src, sem_dst)
    sem_edges = np.unique(np.stack([sem_lo, sem_hi], axis=1), axis=0)

    # --- merge, prefer cooc type for duplicated pairs
    edges = pd.DataFrame(
        {
            "src": np.concatenate([cooc_edges[:, 0], sem_edges[:, 0]]),
            "dst": np.concatenate([cooc_edges[:, 1], sem_edges[:, 1]]),
            "etype": np.concatenate(
                [
                    np.full(len(cooc_edges), ETYPE_COOC),
                    np.full(len(sem_edges), ETYPE_SEMANTIC),
                ]
            ),
        }
    ).drop_duplicates(subset=["src", "dst"], keep="first")
    edges = edges.astype({"src": np.int64, "dst": np.int64, "etype": np.int64})

    graph = symmetrize(
        EdgeGraph(
            n,
            edges["src"].to_numpy(),
            edges["dst"].to_numpy(),
            edges["etype"].to_numpy(),
        )
    )
    return CandidateResult(graph=graph, edges=edges, e_co=e_co, e_se=e_se)


def popularity_pairs(world: EntityWorld, n_pairs: int, seed: int = 0) -> pd.DataFrame:
    """Table I's "TRMP w.o. E&R_s" row: pairs popularity-sampled from the
    Entity Dict with no mining signal at all."""
    rng = np.random.default_rng(seed)
    src = rng.choice(world.config.n_entities, size=n_pairs, p=world.popularity)
    dst = rng.choice(world.config.n_entities, size=n_pairs, p=world.popularity)
    keep = src != dst
    return pd.DataFrame({"src": src[keep], "dst": dst[keep]})
