"""Tests for the synthetic world substrate (entity dict, behaviors,
annotators, services)."""
import numpy as np
import pandas as pd

from repro.world import (
    WorldConfig,
    acc_and_cors,
    annotate_pairs,
    build_world,
    generate_behaviors_pdf,
    make_services,
    simulate_conversions,
    user_preferences,
)
from repro.world.behaviors import week_topic_drift
from repro.world.entity_dict import N_ENTITY_TYPES
from repro.world.services import SERVICE_NAMES, user_topic_affinity


def test_world_deterministic(world):
    w2 = build_world(world.config)
    pd.testing.assert_frame_equal(world.entities, w2.entities)
    np.testing.assert_array_equal(world.vectors, w2.vectors)


def test_entity_dict_schema(world):
    e = world.entities
    assert set(e.columns) >= {"entity_id", "name", "entity_type", "topic", "supertopic", "popularity"}
    assert e["entity_id"].is_unique and e["name"].is_unique
    assert e["entity_type"].str.match(r"type_\d\d").all()
    assert e["topic"].between(0, world.config.n_topics - 1).all()
    assert e["entity_type"].nunique() <= N_ENTITY_TYPES


def test_vectors_unit_norm(world):
    np.testing.assert_allclose(np.linalg.norm(world.vectors, axis=1), 1.0, rtol=1e-9)


def test_popularity_is_distribution(world):
    assert np.isclose(world.popularity.sum(), 1.0)
    assert (world.popularity > 0).all()


def test_affinity_structure(world):
    """Same-topic pairs must be far more affine than cross-supertopic pairs."""
    rng = np.random.default_rng(0)
    topic = world.topic_of
    stopic = world.entities["supertopic"].to_numpy()
    same, cross = [], []
    for _ in range(2000):
        u, v = rng.integers(0, world.config.n_entities, 2)
        if u == v:
            continue
        a = world.true_affinity(np.array([u]), np.array([v]))[0]
        if topic[u] == topic[v]:
            same.append(a)
        elif stopic[u] != stopic[v]:
            cross.append(a)
    assert np.mean(same) > np.mean(cross) + 0.3


def test_names_share_topic_token(world):
    by_topic = world.entities.groupby("topic")["name"].apply(list)
    for _, names in by_topic.items():
        if len(names) < 2:
            continue
        firsts = {n.split()[0] for n in names}
        assert len(firsts) == 1


def test_behavior_log_schema(behaviors_pdf, world):
    assert set(behaviors_pdf.columns) == {"user_id", "week", "ts", "channel", "text"}
    assert behaviors_pdf["week"].between(0, world.config.weeks - 1).all()
    assert behaviors_pdf["user_id"].between(0, world.config.n_users - 1).all()
    assert set(behaviors_pdf["channel"]) <= {"search", "visit"}
    assert len(behaviors_pdf) > world.config.n_users * world.config.weeks * 5


def test_behavior_log_deterministic(world, behaviors_pdf):
    pd.testing.assert_frame_equal(behaviors_pdf, generate_behaviors_pdf(world))


def test_behaviors_mention_known_entities(behaviors_pdf, world):
    names = set(world.name_of)
    hit = 0
    for text in behaviors_pdf["text"].head(200):
        toks = text.split()
        for i in range(len(toks) - 1):
            if f"{toks[i]} {toks[i+1]}" in names:
                hit += 1
                break
    assert hit > 150  # almost every event mentions at least one entity


def test_user_preferences_rows_sum_to_one(world):
    prefs = user_preferences(world)
    assert prefs.shape == (world.config.n_users, world.config.n_topics)
    np.testing.assert_allclose(prefs.sum(axis=1), 1.0, rtol=1e-9)
    # sparse: most entries zero
    assert (prefs > 0).sum(axis=1).max() <= 4


def test_week_drift_shape_and_scale(world):
    d = week_topic_drift(world)
    assert d.shape == (world.config.weeks, world.config.n_topics)
    assert (d > 0).all()
    np.testing.assert_allclose(d.mean(axis=1), 1.0, rtol=1e-9)


# ------------------------------------------------------------- annotators
def test_annotators_reward_same_topic(world):
    rng = np.random.default_rng(1)
    topic = world.topic_of
    same_u, same_v, cross_u, cross_v = [], [], [], []
    stopic = world.entities["supertopic"].to_numpy()
    for _ in range(4000):
        u, v = rng.integers(0, world.config.n_entities, 2)
        if u == v:
            continue
        if topic[u] == topic[v]:
            same_u.append(u)
            same_v.append(v)
        elif stopic[u] != stopic[v]:
            cross_u.append(u)
            cross_v.append(v)
    acc_same, cors_same = acc_and_cors(world, np.array(same_u), np.array(same_v))
    acc_cross, cors_cross = acc_and_cors(world, np.array(cross_u), np.array(cross_v))
    assert acc_same > 0.85
    assert acc_cross < 0.2
    assert cors_same > cors_cross


def test_annotate_scores_in_scale(world):
    rng = np.random.default_rng(2)
    u = rng.integers(0, world.config.n_entities, 100)
    v = rng.integers(0, world.config.n_entities, 100)
    s = annotate_pairs(world, u, v)
    assert set(np.unique(s)) <= {0.0, 0.5, 1.0}


def test_acc_and_cors_empty(world):
    acc, cors = acc_and_cors(world, np.array([]), np.array([]))
    assert acc == 0.0 and cors == 0.0


def test_annotators_deterministic(world):
    u = np.arange(50)
    v = np.arange(50, 100)
    np.testing.assert_array_equal(
        annotate_pairs(world, u, v, seed=3), annotate_pairs(world, u, v, seed=3)
    )


# --------------------------------------------------------------- services
def test_services_distinct_topics(world):
    svcs = make_services(world)
    assert [s.name for s in svcs] == SERVICE_NAMES
    assert len({s.topic for s in svcs}) == len(svcs)
    for s in svcs:
        for e in s.query_entities:
            assert world.topic_of[e] == s.topic


def test_conversion_rewards_affinity(world):
    svc = make_services(world)[0]
    aff = user_topic_affinity(world, svc.topic)
    hi = np.argsort(-aff)[:30]
    lo = np.argsort(aff)[:30]
    # average over repeated simulations to dodge Bernoulli noise
    hi_rate = np.mean([simulate_conversions(world, svc, hi, seed=s).mean() for s in range(20)])
    lo_rate = np.mean([simulate_conversions(world, svc, lo, seed=s).mean() for s in range(20)])
    assert hi_rate > lo_rate + 0.1


def test_conversion_deterministic(world):
    svc = make_services(world)[1]
    users = np.arange(40)
    np.testing.assert_array_equal(
        simulate_conversions(world, svc, users, seed=5),
        simulate_conversions(world, svc, users, seed=5),
    )
