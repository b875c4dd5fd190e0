"""Random-walk corpora for DeepWalk / Node2Vec baselines.

DeepWalk uses uniform random walks; Node2Vec biases transitions with the
return parameter ``p`` and in-out parameter ``q``. Walk co-occurrence feeds
the same SPPMI/SVD factorization as the skip-gram module (the SGNS
equivalence applies identically to walk corpora).
"""
from __future__ import annotations

import numpy as np

from repro.embed.skipgram import sppmi_matrix, svd_embed
from repro.nn.graph import EdgeGraph, adjacency_sets


def _neighbors(adj: list[set[int]]) -> list[np.ndarray]:
    return [np.fromiter(s, dtype=np.int64) if s else np.empty(0, dtype=np.int64) for s in adj]


def random_walks(
    g: EdgeGraph,
    num_walks: int = 8,
    walk_len: int = 20,
    p: float = 1.0,
    q: float = 1.0,
    seed: int = 0,
) -> list[list[int]]:
    """Generate walks; ``p=q=1`` is DeepWalk, otherwise Node2Vec-biased.

    The node2vec bias is applied by rejection-free weighted choice over the
    current node's neighbors given the previous node: weight 1/p to return,
    1 for neighbors of the previous node, 1/q otherwise.
    """
    rng = np.random.default_rng(seed)
    adj = adjacency_sets(g)
    nbrs = _neighbors(adj)
    walks: list[list[int]] = []
    for _ in range(num_walks):
        order = rng.permutation(g.n)
        for start in order:
            if len(nbrs[start]) == 0:
                continue
            walk = [int(start)]
            prev = -1
            while len(walk) < walk_len:
                cur = walk[-1]
                cand = nbrs[cur]
                if len(cand) == 0:
                    break
                if prev < 0 or (p == 1.0 and q == 1.0):
                    nxt = int(cand[rng.integers(len(cand))])
                else:
                    w = np.where(
                        cand == prev,
                        1.0 / p,
                        np.where([c in adj[prev] for c in cand], 1.0, 1.0 / q),
                    )
                    w = w / w.sum()
                    nxt = int(cand[rng.choice(len(cand), p=w)])
                walk.append(nxt)
                prev = cur
            walks.append(walk)
    return walks


def walk_embeddings(
    g: EdgeGraph,
    dim: int = 32,
    window: int = 5,
    num_walks: int = 8,
    walk_len: int = 20,
    p: float = 1.0,
    q: float = 1.0,
    seed: int = 0,
) -> np.ndarray:
    """SGNS-equivalent embeddings of a walk corpus (driver-side numpy)."""
    walks = random_walks(g, num_walks, walk_len, p, q, seed)
    a_list, b_list = [], []
    for walk in walks:
        arr = np.asarray(walk)
        for off in range(1, window + 1):
            if len(arr) <= off:
                continue
            a_list.append(arr[:-off])
            b_list.append(arr[off:])
    if not a_list:
        return np.zeros((g.n, dim))
    import pandas as pd

    pairs = pd.DataFrame(
        {"a": np.concatenate(a_list), "b": np.concatenate(b_list)}
    )
    counts = pairs.groupby(["a", "b"]).size().reset_index(name="cnt")
    return svd_embed(sppmi_matrix(counts, g.n), dim)
