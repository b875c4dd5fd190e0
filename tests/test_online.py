"""Tests for the online stage: graph reasoning + targeting + A/B harness."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.online import ab_test, egl_target_users, rule_based_target_users
from repro.core.preference import user_embeddings
from repro.graphstore import GeaStore
from repro.nlp import entity_sequences, extract_entities
from repro.world import make_services
from repro.world.services import user_topic_affinity


@pytest.fixture(scope="module")
def online_world(spark, world, behaviors_sdf, tmp_path_factory):
    """A minimal 'deployed' EGL: stored entity graph from the latent truth
    (standing in for TRMP output — the TRMP path is covered by
    test_trmp_integration), plus user embeddings."""
    mentions = extract_entities(
        behaviors_sdf, world.name_of, world.popularity, p_miss=0.0, p_confuse=0.0
    ).cache()
    seqs = entity_sequences(mentions).cache()
    # entity graph: true-affinity relations (as if mined perfectly)
    aff = world.vectors @ world.vectors.T
    np.fill_diagonal(aff, 0)
    src, dst = np.where(np.triu(aff > 0.62, 1))
    store = GeaStore(spark, tmp_path_factory.mktemp("gea") / "graph")
    store.put_relations(pd.DataFrame({"src": src, "dst": dst}))
    # h_e: latent vectors with noise (stand-in for ensemble embeddings)
    rng = np.random.default_rng(0)
    h_e = world.vectors + 0.05 * rng.normal(size=world.vectors.shape)
    users = user_embeddings(seqs, h_e).cache()
    return store, users, h_e, mentions


def test_egl_targeting_returns_topk(spark, world, online_world):
    store, users, h_e, mentions = online_world
    svc = make_services(world)[0]
    res = egl_target_users(store, users, h_e, svc, k_hops=2, top_k=30)
    assert len(res.users) == 30
    assert len(np.unique(res.users)) == 30
    assert res.running_time_s > 0
    assert set(svc.query_entities) <= set(res.expanded_entities.tolist())


def test_egl_expansion_respects_khops(spark, world, online_world):
    store, users, h_e, mentions = online_world
    svc = make_services(world)[1]
    r1 = egl_target_users(store, users, h_e, svc, k_hops=1, top_k=10, max_entities=10_000)
    r2 = egl_target_users(store, users, h_e, svc, k_hops=2, top_k=10, max_entities=10_000)
    assert len(r2.expanded_entities) >= len(r1.expanded_entities)


def test_egl_targets_interested_users(spark, world, online_world):
    """Targeted users must have higher true affinity than average users."""
    store, users, h_e, mentions = online_world
    svc = make_services(world)[0]
    res = egl_target_users(store, users, h_e, svc, k_hops=2, top_k=25)
    aff = user_topic_affinity(world, svc.topic)
    assert aff[res.users].mean() > aff.mean() * 1.3


def test_rule_based_targets_tag_matchers(spark, world, online_world):
    store, users, h_e, mentions = online_world
    svc = make_services(world)[2]
    targeted = rule_based_target_users(mentions, svc, world, top_k=50)
    assert len(targeted) <= 50
    types = world.entities["entity_type"].to_numpy()
    tags = {types[int(e)] for e in svc.query_entities}
    tagged = [int(e) for e in range(world.config.n_entities) if types[e] in tags]
    hit_users = (
        mentions.filter(F.col("entity_id").isin(tagged))
        .select("user_id")
        .distinct()
        .toPandas()["user_id"]
        .to_numpy()
    )
    assert set(targeted) <= set(hit_users)


def test_ab_test_rows(spark, world, online_world):
    store, users, h_e, mentions = online_world
    services = make_services(world)
    rows = ab_test(world, store, users, h_e, mentions, services, top_k=40, seed=1)
    assert [r.service for r in rows] == [s.name for s in services]
    for r in rows:
        assert 0.0 <= r.cvr_egl <= 1.0 and 0.0 <= r.cvr_rule <= 1.0
        assert r.running_time_s > 0
        assert r.conversions_egl >= 0


def test_ab_test_egl_wins_on_average(spark, world, online_world):
    """The Table-III headline: EGL CVR >= rule CVR on average (graph
    expansion finds genuinely interested users the literal tag misses)."""
    store, users, h_e, mentions = online_world
    services = make_services(world)
    rows = ab_test(world, store, users, h_e, mentions, services, top_k=40, seed=2)
    mean_egl = np.mean([r.cvr_egl for r in rows])
    mean_rule = np.mean([r.cvr_rule for r in rows])
    assert mean_egl >= mean_rule - 0.02
