"""Edge-case tests across modules (fast, Spark-free)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.alpc import semantic_anchor_pairs, semantic_hard_negatives
from repro.eval.metrics import aeec, auc, relation_acc_cors
from repro.embed.skipgram import sppmi_matrix, svd_embed
from repro.nlp.ner import build_trie, match_entities
from repro.nlp.semantic import _ngrams, top_k_similar
from repro.nn.autograd import Tensor
from repro.nn.graph import (
    EdgeGraph,
    add_self_loops,
    adjacency_sets,
    drnl_labels,
    gcn_norm,
    k_hop_nodes,
    symmetrize,
)
from repro.world.entity_dict import WorldConfig, build_world

from tests.model_fixtures import synthetic_link_dataset


# ----------------------------------------------------------------- world
def test_world_single_entity_per_topic():
    w = build_world(WorldConfig(n_entities=12, n_topics=12, n_super=3, n_users=5, weeks=1))
    assert len(w.entities) == 12
    assert w.popularity.shape == (12,)


def test_world_more_supers_than_topics_rejected_gracefully():
    # n_super > n_topics is legal: topics cycle through supers
    w = build_world(WorldConfig(n_entities=20, n_topics=4, n_super=8, n_users=5, weeks=1))
    assert w.entities["supertopic"].nunique() <= 4


def test_true_affinity_self_is_one(world):
    idx = np.arange(10)
    np.testing.assert_allclose(world.true_affinity(idx, idx), 1.0, rtol=1e-9)


# ------------------------------------------------------------------- nlp
def test_ngrams_short_string():
    assert _ngrams("a") == ["^a$"]
    assert _ngrams("ab") == ["^ab", "ab$"]


def test_trie_empty_dict():
    assert match_entities("foo bar".split(), build_trie([])) == []


def test_trie_single_token_names():
    trie = build_trie(["x", "y z"])
    assert match_entities("x y z x".split(), trie) == [0, 1, 0]


def test_top_k_similar_k_larger_than_n():
    emb = np.eye(3)
    idx, sim = top_k_similar(emb, 2)
    assert idx.shape == (3, 2)


# ----------------------------------------------------------------- embed
def test_sppmi_asymmetric_option():
    counts = pd.DataFrame({"a": [0, 1], "b": [1, 2], "cnt": [4, 1]})
    m = sppmi_matrix(counts, 3, shift=0.0, symmetric=False)
    assert m[0, 1] > 0 and m[1, 0] == 0


def test_svd_embed_dim_larger_than_matrix():
    m = np.zeros((3, 3))
    m[0, 1] = m[1, 0] = 1.0
    emb = svd_embed(m, 10)
    assert emb.shape == (3, 3)  # capped by matrix rank dims


# ----------------------------------------------------------------- graph
def test_symmetrize_idempotent():
    g = symmetrize(EdgeGraph(4, np.array([0, 1]), np.array([1, 2])))
    g2 = symmetrize(g)
    assert g2.m == g.m


def test_add_self_loops_counts():
    g = EdgeGraph(3, np.array([0]), np.array([1]))
    assert add_self_loops(g).m == 4


def test_gcn_norm_self_loop_only():
    g = add_self_loops(EdgeGraph(2, np.array([], dtype=int), np.array([], dtype=int)))
    w = gcn_norm(g)
    np.testing.assert_allclose(w, 1.0)


def test_k_hop_cap():
    # star graph: center 0 with 10 leaves; cap forces truncation
    src = np.zeros(10, dtype=int)
    dst = np.arange(1, 11)
    adj = adjacency_sets(symmetrize(EdgeGraph(11, src, dst)))
    out = k_hop_nodes(adj, [0], 1, cap=3)
    assert len(out) == 4  # seed + 3 capped


def test_drnl_disconnected_node_gets_max_label():
    g = EdgeGraph(4, np.array([0, 1]), np.array([1, 0]))
    adj = adjacency_sets(g)
    lab = drnl_labels(adj, [0, 1, 3], 0, 1, max_label=5)
    assert lab[2] == 5


def test_k_hop_zero_hops():
    adj = adjacency_sets(symmetrize(EdgeGraph(3, np.array([0]), np.array([1]))))
    assert k_hop_nodes(adj, [0], 0) == {0}


# --------------------------------------------------------------- metrics
def test_auc_all_same_label_nan():
    assert np.isnan(auc(np.array([1.0, 2.0]), np.array([1, 1])))


def test_relation_acc_cors_subsamples(world):
    src = np.zeros(10_000, dtype=int)
    dst = np.ones(10_000, dtype=int)
    acc, cors = relation_acc_cors(world, src, dst, max_pairs=100)
    assert 0.0 <= acc <= 1.0 and 0.0 <= cors <= 1.0


def test_aeec_zero_dict():
    assert aeec(10, 0) == 10.0  # guarded against div-by-zero


# ----------------------------------------------------------- alpc helpers
@pytest.fixture(scope="module")
def ds(world):
    return synthetic_link_dataset(world, seed=9)


def test_anchor_and_hard_negative_pools_disjoint(ds):
    a_s, a_d = semantic_anchor_pairs(ds, tau_cl=0.6)
    h_s, h_d = semantic_hard_negatives(ds, tau_neg=0.3)
    anchors = set(zip(a_s.tolist(), a_d.tolist()))
    hards = set(zip(h_s.tolist(), h_d.tolist()))
    assert not (anchors & hards)


def test_hard_negatives_are_semantically_far(ds):
    h_s, h_d = semantic_hard_negatives(ds, tau_neg=0.3)
    if len(h_s) == 0:
        pytest.skip("no hard negatives in this tiny world")
    e = ds.e_se
    cos = np.einsum("ij,ij->i", e[h_s], e[h_d]) / (
        np.linalg.norm(e[h_s], axis=1) * np.linalg.norm(e[h_d], axis=1)
    )
    assert (cos < 0.3).all()


def test_anchors_are_semantically_close(ds):
    a_s, a_d = semantic_anchor_pairs(ds, tau_cl=0.6)
    e = ds.e_se
    cos = np.einsum("ij,ij->i", e[a_s], e[a_d]) / (
        np.linalg.norm(e[a_s], axis=1) * np.linalg.norm(e[a_d], axis=1)
    )
    assert (cos > 0.6).all()


# --------------------------------------------------------------- tensors
def test_tensor_scalar_ops():
    t = Tensor(np.array([1.0, 2.0]), requires_grad=True)
    out = (2.0 - t) / 2.0 + (1.0 / t)
    out.sum().backward()
    assert t.grad is not None


def test_tensor_pow_negative_exponent_grad():
    t = Tensor(np.array([2.0]), requires_grad=True)
    (t**-2.0).backward()
    np.testing.assert_allclose(t.grad, [-2.0 * 2.0**-3.0])
