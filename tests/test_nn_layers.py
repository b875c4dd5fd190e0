"""Tests for layers, optimizer and graph utilities of the nn substrate."""
import numpy as np

from repro.nn.autograd import Tensor
from repro.nn.layers import (
    LSTMCell,
    Linear,
    MLP,
    MultiHeadAttention,
    embedding_table,
    lookup,
)
from repro.nn.optim import Adam
from repro.nn import graph as G


def test_linear_shapes_and_params():
    rng = np.random.default_rng(1)
    lin = Linear(4, 3, rng)
    out = lin(Tensor(rng.normal(size=(5, 4))))
    assert out.shape == (5, 3)
    assert len(lin.parameters()) == 2


def test_mlp_learns_xor():
    rng = np.random.default_rng(2)
    X = np.array([[0, 0], [0, 1], [1, 0], [1, 1]], dtype=float)
    y = np.array([[0.0], [1.0], [1.0], [0.0]])
    mlp = MLP([2, 16, 1], rng)
    opt = Adam(mlp.parameters(), lr=0.05)
    for _ in range(300):
        opt.zero_grad()
        p = mlp(Tensor(X)).sigmoid()
        loss = ((p - Tensor(y)) ** 2.0).mean()
        loss.backward()
        opt.step()
    preds = mlp(Tensor(X)).sigmoid().data
    assert np.all((preds > 0.5) == (y > 0.5))


def test_lstm_cell_step_shapes_and_grad():
    rng = np.random.default_rng(3)
    cell = LSTMCell(4, 6, rng)
    x = Tensor(rng.normal(size=(5, 4)))
    h = Tensor(np.zeros((5, 6)))
    c = Tensor(np.zeros((5, 6)))
    h2, c2 = cell(x, h, c)
    assert h2.shape == (5, 6) and c2.shape == (5, 6)
    (h2.sum() + c2.sum()).backward()
    for p in cell.parameters():
        assert p.grad is not None and np.isfinite(p.grad).all()


def test_multihead_attention_shapes_and_grad():
    rng = np.random.default_rng(4)
    attn = MultiHeadAttention(8, 2, rng)
    x = Tensor(rng.normal(size=(3, 4, 8)), requires_grad=True)
    out = attn(x)
    assert out.shape == (3, 4, 8)
    out.sum().backward()
    assert x.grad is not None and np.isfinite(x.grad).all()
    for p in attn.parameters():
        assert p.grad is not None


def test_embedding_lookup_grad():
    rng = np.random.default_rng(5)
    table = embedding_table(rng, 10, 4)
    idx = np.array([1, 1, 3])
    out = lookup(table, idx)
    out.sum().backward()
    assert table.grad[1].sum() != 0
    np.testing.assert_allclose(table.grad[1], 2.0)  # row used twice
    np.testing.assert_allclose(table.grad[0], 0.0)


def test_adam_converges_on_quadratic():
    x = Tensor(np.array([5.0, -3.0]), requires_grad=True)
    opt = Adam([x], lr=0.2)
    for _ in range(200):
        opt.zero_grad()
        ((x * x).sum()).backward()
        opt.step()
    assert np.abs(x.data).max() < 1e-2


def test_adam_clip():
    x = Tensor(np.array([1.0]), requires_grad=True)
    opt = Adam([x], lr=0.1, clip=1.0)
    opt.zero_grad()
    (x * 1e6).backward()
    opt.step()
    assert np.isfinite(x.data).all()


# ------------------------------------------------------------- graph utils
def _toy_graph() -> G.EdgeGraph:
    # 0-1, 1-2, 2-3 chain plus 0-3
    return G.EdgeGraph(4, np.array([0, 1, 2, 0]), np.array([1, 2, 3, 3]))


def test_symmetrize_and_self_loops():
    g = G.symmetrize(_toy_graph())
    assert g.m == 8
    pairs = set(zip(g.src.tolist(), g.dst.tolist()))
    assert (1, 0) in pairs and (3, 2) in pairs
    g2 = G.add_self_loops(g)
    assert g2.m == 12


def test_gcn_norm_values():
    g = G.add_self_loops(G.symmetrize(_toy_graph()))
    w = G.gcn_norm(g)
    assert w.shape == (g.m,)
    assert np.all(w > 0) and np.all(w <= 1.0)


def test_k_hop_nodes():
    g = G.symmetrize(_toy_graph())
    adj = G.adjacency_sets(g)
    assert G.k_hop_nodes(adj, [0], 1) == {0, 1, 3}
    assert G.k_hop_nodes(adj, [0], 2) == {0, 1, 2, 3}


def test_drnl_labels_endpoints_are_one():
    g = G.symmetrize(_toy_graph())
    adj = G.adjacency_sets(g)
    nodes = [0, 1, 2, 3]
    lab = G.drnl_labels(adj, nodes, 0, 3)
    assert lab[0] == 1 and lab[3] == 1
    assert lab[1] > 1 and lab[2] > 1


def test_etype_preserved_through_symmetrize():
    g = G.EdgeGraph(3, np.array([0, 1]), np.array([1, 2]), np.array([0, 1]))
    sg = G.symmetrize(g)
    assert sg.etype is not None and len(sg.etype) == sg.m
