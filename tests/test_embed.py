"""Tests for the embedding substrate (co-occurrence + walks)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.embed import (
    cooccurrence_counts,
    cooccurrence_embeddings,
    random_walks,
    sppmi_matrix,
    svd_embed,
    walk_embeddings,
)
from repro.nlp import entity_sequences, extract_entities
from repro.nn.graph import EdgeGraph, symmetrize
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def sequences(spark, world, behaviors_sdf):
    mentions = extract_entities(
        behaviors_sdf, world.name_of, world.popularity, p_miss=0.0, p_confuse=0.0
    )
    return entity_sequences(mentions).cache()


def test_cooccurrence_counts_against_oracle(spark, sequences):
    counts = cooccurrence_counts(sequences, window=3)
    tokens = sequences.select(
        "user_id", "week", F.posexplode("entity_seq").alias("pos", "entity")
    )
    assert_equivalent(
        counts,
        """
        SELECT a.entity AS a, b.entity AS b, COUNT(*) AS cnt
        FROM tokens a JOIN tokens b
          ON a.user_id = b.user_id AND a.week = b.week
         AND b.pos > a.pos AND b.pos <= a.pos + 3
        GROUP BY 1, 2
        """,
        tokens=tokens,
    )


def test_cooccurrence_window_monotone(spark, sequences):
    c2 = cooccurrence_counts(sequences, window=2).agg(F.sum("cnt")).first()[0]
    c5 = cooccurrence_counts(sequences, window=5).agg(F.sum("cnt")).first()[0]
    assert c5 > c2


def test_sppmi_basic_properties():
    counts = pd.DataFrame({"a": [0, 0, 1], "b": [1, 2, 2], "cnt": [10, 1, 1]})
    m = sppmi_matrix(counts, 4)
    assert m.shape == (4, 4)
    assert (m >= 0).all()
    np.testing.assert_allclose(m, m.T)
    assert m[3].sum() == 0  # isolated token row empty


def test_sppmi_empty_counts():
    m = sppmi_matrix(pd.DataFrame({"a": [], "b": [], "cnt": []}, dtype=int), 3)
    np.testing.assert_allclose(m, 0.0)


def test_svd_embed_zero_rows_stay_zero():
    counts = pd.DataFrame({"a": [0], "b": [1], "cnt": [5]})
    emb = svd_embed(sppmi_matrix(counts, 4, shift=0.0), 2)
    assert np.isfinite(emb).all()
    np.testing.assert_allclose(emb[3], 0.0)
    assert np.linalg.norm(emb[0]) > 0.9


def test_cooccurrence_embeddings_track_topics(spark, world, sequences):
    emb, counts = cooccurrence_embeddings(sequences, world.config.n_entities, dim=16)
    assert emb.shape == (world.config.n_entities, 16)
    assert np.isfinite(emb).all()
    assert len(counts) > 0
    sims = emb @ emb.T
    topic = world.topic_of
    rng = np.random.default_rng(0)
    same, diff = [], []
    for _ in range(4000):
        u, v = rng.integers(0, world.config.n_entities, 2)
        if u == v or np.linalg.norm(emb[u]) == 0 or np.linalg.norm(emb[v]) == 0:
            continue
        (same if topic[u] == topic[v] else diff).append(sims[u, v])
    assert np.mean(same) > np.mean(diff) + 0.15


# ------------------------------------------------------------------ walks
def _ring(n=20) -> EdgeGraph:
    src = np.arange(n)
    dst = (src + 1) % n
    return symmetrize(EdgeGraph(n, src, dst))


def test_random_walks_shape_and_validity():
    g = _ring()
    walks = random_walks(g, num_walks=2, walk_len=10, seed=1)
    assert len(walks) == 2 * g.n
    adj = {(int(s), int(d)) for s, d in zip(g.src, g.dst)}
    for w in walks:
        assert len(w) == 10
        for a, b in zip(w[:-1], w[1:]):
            assert (a, b) in adj


def test_node2vec_bias_changes_walks():
    g = _ring()
    dw = random_walks(g, num_walks=4, walk_len=15, seed=2)
    n2v = random_walks(g, num_walks=4, walk_len=15, p=4.0, q=0.25, seed=2)
    # low q (outward) on a ring → fewer immediate backtracks than uniform
    def backtracks(walks):
        return sum(
            1 for w in walks for i in range(2, len(w)) if w[i] == w[i - 2]
        )
    assert backtracks(n2v) < backtracks(dw)


def test_walk_embeddings_cluster_ring_neighbors():
    g = _ring(30)
    emb = walk_embeddings(g, dim=8, seed=3)
    assert emb.shape == (30, 8)
    near = np.mean([emb[i] @ emb[(i + 1) % 30] for i in range(30)])
    far = np.mean([emb[i] @ emb[(i + 15) % 30] for i in range(30)])
    assert near > far


def test_walk_embeddings_isolated_nodes_zero():
    g = EdgeGraph(5, np.array([0, 1]), np.array([1, 0]))
    emb = walk_embeddings(g, dim=4, seed=4)
    np.testing.assert_allclose(emb[4], 0.0)
