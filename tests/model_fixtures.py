"""Spark-free LinkDataset construction for model unit tests.

Fabricates a CandidateResult directly from the world's latent structure
(true-affinity edges + noise, deterministic embeddings) so model tests do
not need the Spark pipeline; the full pipeline path is covered by the
integration tests and benchmarks.
"""
import numpy as np
import pandas as pd

from repro.core.candidate_generation import CandidateResult, ETYPE_COOC, ETYPE_SEMANTIC
from repro.eval.datasets import LinkDataset, build_dataset_m
from repro.nlp.semantic import semantic_embeddings
from repro.nn.graph import EdgeGraph, symmetrize
from repro.world.entity_dict import EntityWorld


def synthetic_candidates(world: EntityWorld, dim: int = 16, seed: int = 0) -> CandidateResult:
    """Candidate edges = true-affinity-driven pairs with ~25% noise edges."""
    rng = np.random.default_rng(seed)
    n = world.config.n_entities
    aff = world.vectors @ world.vectors.T
    np.fill_diagonal(aff, -np.inf)
    src, dst = np.where(np.triu(aff > 0.62, 1))
    n_noise = len(src) // 3
    ns = rng.integers(0, n, n_noise)
    nd = rng.integers(0, n, n_noise)
    keep = ns != nd
    src = np.concatenate([src, np.minimum(ns[keep], nd[keep])])
    dst = np.concatenate([dst, np.maximum(ns[keep], nd[keep])])
    etype = np.concatenate(
        [np.full(len(src) - keep.sum(), ETYPE_COOC), np.full(keep.sum(), ETYPE_SEMANTIC)]
    )
    edges = pd.DataFrame({"src": src, "dst": dst, "etype": etype}).drop_duplicates(
        subset=["src", "dst"]
    )
    e_se = semantic_embeddings(world, dim=dim)
    # noisy co-occurrence embedding: latent vectors + noise, projected to dim
    proj = rng.normal(size=(world.vectors.shape[1], dim)) / np.sqrt(dim)
    e_co = world.vectors @ proj + 0.5 * rng.normal(size=(n, dim))
    e_co /= np.linalg.norm(e_co, axis=1, keepdims=True) + 1e-12
    graph = symmetrize(
        EdgeGraph(
            n,
            edges["src"].to_numpy(),
            edges["dst"].to_numpy(),
            edges["etype"].to_numpy(),
        )
    )
    return CandidateResult(graph=graph, edges=edges, e_co=e_co, e_se=e_se)


def synthetic_link_dataset(world: EntityWorld, seed: int = 0) -> LinkDataset:
    return build_dataset_m(synthetic_candidates(world, seed=seed), world, seed=seed)
