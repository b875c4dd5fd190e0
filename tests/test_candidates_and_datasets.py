"""Tests for Stage-I candidate generation, metrics, and Dataset-M splits."""
import numpy as np
import pytest

from repro.core.candidate_generation import (
    ETYPE_COOC,
    ETYPE_SEMANTIC,
    generate_candidates,
    popularity_pairs,
)
from repro.eval import auc, aeec, build_dataset_m, relation_acc_cors, sample_subdataset
from repro.nlp import entity_sequences, extract_entities


@pytest.fixture(scope="module")
def sequences(spark, world, behaviors_sdf):
    mentions = extract_entities(behaviors_sdf, world.name_of, world.popularity)
    return entity_sequences(mentions).cache()


@pytest.fixture(scope="module")
def candidates(spark, world, sequences):
    return generate_candidates(sequences, world, dim=16, k_semantic=6)


def test_candidate_graph_valid(candidates, world):
    g = candidates.graph
    assert g.n == world.config.n_entities
    assert g.m > 0
    assert (g.src != g.dst).all()
    assert set(np.unique(g.etype)) <= {ETYPE_COOC, ETYPE_SEMANTIC}
    # symmetrized: every edge has its reverse
    pairs = set(zip(g.src.tolist(), g.dst.tolist()))
    assert all((d, s) in pairs for s, d in list(pairs)[:200])


def test_candidate_edges_both_sources(candidates):
    etypes = set(candidates.edges["etype"])
    assert ETYPE_COOC in etypes and ETYPE_SEMANTIC in etypes


def test_candidate_features_shape(candidates, world):
    f = candidates.features
    assert f.shape == (world.config.n_entities, 32)
    assert np.isfinite(f).all()


def test_candidate_accuracy_in_paper_regime(candidates, world):
    """Stage-I relations should be clearly better than popularity pairs but
    'far lower than 90%' accurate (the paper's observation)."""
    acc_c, cors_c = relation_acc_cors(
        world, candidates.edges["src"].to_numpy(), candidates.edges["dst"].to_numpy()
    )
    pp = popularity_pairs(world, 2000, seed=1)
    acc_p, cors_p = relation_acc_cors(world, pp["src"].to_numpy(), pp["dst"].to_numpy())
    assert acc_c > acc_p
    assert acc_c < 0.93
    assert cors_c > cors_p


def test_popularity_pairs_no_self(world):
    pp = popularity_pairs(world, 500, seed=2)
    assert (pp["src"] != pp["dst"]).all()


# ---------------------------------------------------------------- metrics
def test_auc_perfect_and_random():
    y = np.array([0, 0, 1, 1])
    assert auc(np.array([0.1, 0.2, 0.8, 0.9]), y) == 1.0
    assert auc(np.array([0.9, 0.8, 0.2, 0.1]), y) == 0.0
    assert auc(np.array([0.5, 0.5, 0.5, 0.5]), y) == 0.5


def test_auc_ties_and_degenerate():
    y = np.array([0, 1, 1, 0])
    s = np.array([0.3, 0.3, 0.9, 0.1])
    assert 0.5 < auc(s, y) < 1.0
    assert np.isnan(auc(np.array([1.0]), np.array([1])))


def test_aeec():
    assert aeec(100, 50) == 2.0
    assert aeec(0, 0) == 0.0


# --------------------------------------------------------------- datasets
@pytest.fixture(scope="module")
def dataset_m(candidates, world):
    return build_dataset_m(candidates, world, seed=3)


def test_dataset_m_structure(dataset_m):
    ds = dataset_m
    assert ds.n == len(ds.nodes)
    assert ds.features.shape[0] == ds.n
    assert len(ds.train_src) == len(ds.train_dst) == len(ds.train_y)
    assert len(ds.test_src) == len(ds.test_y)
    # 1:3 pos:neg (allowing sampling shortfall)
    assert 2.0 < (ds.train_y == 0).sum() / max(1, (ds.train_y == 1).sum()) <= 3.0
    assert ds.graph.n == ds.n
    assert ds.train_src.max() < ds.n and ds.test_src.max() < ds.n


def test_dataset_m_positives_in_stage1_regime(dataset_m, world):
    """The group-level manual-eval gate leaves a NOISY initial graph (the
    paper's Stage-I regime, ~70-85% accurate) — cleaning it is the ranking
    stage's job, so positives must be imperfect but far above chance."""
    ds = dataset_m
    pos = ds.train_y == 1
    acc, _ = relation_acc_cors(
        world, ds.to_world(ds.train_src[pos]), ds.to_world(ds.train_dst[pos])
    )
    assert 0.55 < acc < 0.98


def test_dataset_m_acc_pool(dataset_m):
    """Pool = graph relations + 2-hop exploration pairs, all valid ids."""
    ds = dataset_m
    assert len(ds.acc_src) == len(ds.acc_dst) > 0
    assert ds.acc_src.max() < ds.n and ds.acc_dst.max() < ds.n
    gset = set(zip(ds.graph.src.tolist(), ds.graph.dst.tolist()))
    is_edge = np.array(
        [(int(a), int(b)) in gset for a, b in zip(ds.acc_src, ds.acc_dst)]
    )
    # both halves of the pool are represented
    assert 0 < is_edge.sum() < len(is_edge)


def test_dataset_m_test_edges_not_in_train_graph(dataset_m):
    ds = dataset_m
    gset = set(zip(ds.graph.src.tolist(), ds.graph.dst.tolist()))
    pos = ds.test_y == 1
    leaked = sum(
        (int(s), int(d)) in gset
        for s, d in zip(ds.test_src[pos], ds.test_dst[pos])
    )
    assert leaked == 0


def test_dataset_m_negatives_are_nonedges(dataset_m):
    ds = dataset_m
    pos_pairs = {
        (int(min(s, d)), int(max(s, d)))
        for s, d in zip(
            np.concatenate([ds.train_src[ds.train_y == 1], ds.test_src[ds.test_y == 1]]),
            np.concatenate([ds.train_dst[ds.train_y == 1], ds.test_dst[ds.test_y == 1]]),
        )
    }
    neg = ds.train_y == 0
    for s, d in zip(ds.train_src[neg][:500], ds.train_dst[neg][:500]):
        assert (int(min(s, d)), int(max(s, d))) not in pos_pairs


def test_sample_subdataset_ratios(dataset_m):
    for ratio in (0.5, 0.3):
        sub = sample_subdataset(dataset_m, ratio, seed=4)
        assert sub.n == max(10, int(dataset_m.n * ratio))
        assert sub.graph.src.max(initial=0) < sub.n
        assert len(sub.train_src) < len(dataset_m.train_src)
        assert sub.features.shape == (sub.n, dataset_m.features.shape[1])
        # local→world mapping consistent
        assert set(sub.nodes) <= set(dataset_m.nodes)


def test_sample_subdataset_preserves_labels(dataset_m):
    sub = sample_subdataset(dataset_m, 0.6, seed=5)
    assert set(np.unique(sub.train_y)) <= {0.0, 1.0}
    assert (sub.test_y == 1).sum() > 0 and (sub.test_y == 0).sum() > 0
