"""Tests for the NLP substrate: trie NER, Spark extraction, sequences,
semantic embeddings."""
import numpy as np
import pandas as pd
from pyspark.sql import functions as F

from repro.nlp import (
    build_trie,
    entity_sequences,
    extract_entities,
    match_entities,
    semantic_embeddings,
    tokenize,
    top_k_similar,
)
from repro.oracle import assert_equivalent


def test_tokenize_lowercases():
    assert tokenize("Foo BAR baz") == ["foo", "bar", "baz"]


def test_trie_maximal_match():
    names = ["ka ro", "ka ro su", "mi"]
    trie = build_trie(names)
    # longest match wins: "ka ro su" (id 1), then "mi" (id 2)
    assert match_entities("ka ro su mi".split(), trie) == [1, 2]
    assert match_entities("ka ro mi".split(), trie) == [0, 2]
    assert match_entities("zz ka".split(), trie) == []


def test_trie_handles_overlapping_prefixes():
    names = ["a b c", "b c", "c"]
    trie = build_trie(names)
    assert match_entities("a b c".split(), trie) == [0]
    assert match_entities("x b c".split(), trie) == [1]


def test_extract_entities_no_noise(spark, world, behaviors_sdf):
    mentions = extract_entities(
        behaviors_sdf, world.name_of, world.popularity, p_miss=0.0, p_confuse=0.0
    ).cache()
    n = mentions.count()
    assert n > 0
    # every mention must be a valid entity id
    mx = mentions.agg(F.max("entity_id"), F.min("entity_id")).first()
    assert 0 <= mx[1] and mx[0] < world.config.n_entities
    # with a clean tagger, mention topics should track user preferences:
    # mentions per user concentrate on few topics
    pdf = mentions.toPandas()
    topics = world.topic_of[pdf["entity_id"].to_numpy()]
    per_user = pd.DataFrame({"u": pdf["user_id"], "t": topics}).groupby("u")["t"].nunique()
    assert per_user.median() <= 6


def test_extract_entities_miss_rate(spark, world, behaviors_sdf):
    clean = extract_entities(
        behaviors_sdf, world.name_of, world.popularity, p_miss=0.0, p_confuse=0.0
    ).count()
    lossy = extract_entities(
        behaviors_sdf, world.name_of, world.popularity, p_miss=0.5, p_confuse=0.0
    ).count()
    assert 0.35 * clean < lossy < 0.65 * clean


def test_extract_entities_deterministic(spark, world, behaviors_sdf):
    a = extract_entities(behaviors_sdf, world.name_of, world.popularity, seed=1)
    b = extract_entities(behaviors_sdf, world.name_of, world.popularity, seed=1)
    pa = a.toPandas().sort_values(["user_id", "ts", "entity_id"]).reset_index(drop=True)
    pb = b.toPandas().sort_values(["user_id", "ts", "entity_id"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(pa, pb)


def test_entity_sequences_ordered_and_complete(spark, world, behaviors_sdf):
    mentions = extract_entities(
        behaviors_sdf, world.name_of, world.popularity, p_miss=0.0, p_confuse=0.0
    ).cache()
    seqs = entity_sequences(mentions).cache()
    # row count == distinct (user, week) groups — checked against DuckDB
    counts = seqs.select(
        "user_id", "week", F.size("entity_seq").alias("seq_len")
    )
    assert_equivalent(
        counts,
        """
        SELECT user_id, week, COUNT(*) AS seq_len
        FROM mentions GROUP BY user_id, week
        """,
        mentions=mentions,
    )
    # chronological order within one group
    row = seqs.first()
    m = (
        mentions.filter(
            (F.col("user_id") == row["user_id"]) & (F.col("week") == row["week"])
        )
        .orderBy("ts", "entity_id")
        .toPandas()
    )
    # sort_array sorts by (ts, entity_id) struct — same tiebreak
    assert list(row["entity_seq"]) == m["entity_id"].tolist()


# ---------------------------------------------------------------- semantic
def test_semantic_embeddings_unit_norm(world):
    emb = semantic_embeddings(world)
    assert emb.shape == (world.config.n_entities, 32)
    np.testing.assert_allclose(np.linalg.norm(emb, axis=1), 1.0, rtol=1e-9)


def test_semantic_embeddings_deterministic(world):
    np.testing.assert_array_equal(semantic_embeddings(world), semantic_embeddings(world))


def test_semantic_similarity_tracks_topics(world):
    emb = semantic_embeddings(world)
    topic = world.topic_of
    sims = emb @ emb.T
    same, diff = [], []
    rng = np.random.default_rng(3)
    for _ in range(4000):
        u, v = rng.integers(0, world.config.n_entities, 2)
        if u == v:
            continue
        (same if topic[u] == topic[v] else diff).append(sims[u, v])
    assert np.mean(same) > np.mean(diff) + 0.3


def test_top_k_similar_shapes_and_ordering(world):
    emb = semantic_embeddings(world)
    idx, sim = top_k_similar(emb, 5)
    assert idx.shape == (world.config.n_entities, 5)
    assert (np.diff(sim, axis=1) <= 1e-12).all()  # descending
    assert not (idx == np.arange(len(emb))[:, None]).any()  # no self


def test_top_k_similar_finds_topic_mates(world):
    emb = semantic_embeddings(world)
    idx, _ = top_k_similar(emb, 5)
    topic = world.topic_of
    frac_same = (topic[idx] == topic[:, None]).mean()
    assert frac_same > 0.5
