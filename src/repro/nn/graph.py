"""Sparse-graph utilities for message passing on the numpy substrate.

A graph is held as flat edge arrays (``src``, ``dst``) over ``n`` nodes —
the COO layout that :func:`repro.nn.autograd.segment_sum` /
``segment_softmax`` aggregate over. Helpers here build symmetric edge lists,
add self loops, compute GCN normalization, and sample k-hop neighborhoods
(for SEAL-style enclosing subgraphs).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class EdgeGraph:
    """Directed edge list over ``n`` nodes (use :func:`symmetrize` for undirected)."""

    n: int
    src: np.ndarray
    dst: np.ndarray
    etype: np.ndarray | None = None  # optional relation type per edge (CompGCN)

    @property
    def m(self) -> int:
        return len(self.src)


def symmetrize(g: EdgeGraph) -> EdgeGraph:
    """Add reverse edges (and dedupe) so aggregation sees both directions."""
    src = np.concatenate([g.src, g.dst])
    dst = np.concatenate([g.dst, g.src])
    et = np.concatenate([g.etype, g.etype]) if g.etype is not None else None
    key = src.astype(np.int64) * g.n + dst
    _, idx = np.unique(key, return_index=True)
    return EdgeGraph(
        g.n, src[idx], dst[idx], et[idx] if et is not None else None
    )


def add_self_loops(g: EdgeGraph, loop_type: int | None = None) -> EdgeGraph:
    loops = np.arange(g.n)
    src = np.concatenate([g.src, loops])
    dst = np.concatenate([g.dst, loops])
    et = None
    if g.etype is not None:
        et = np.concatenate([g.etype, np.full(g.n, loop_type if loop_type is not None else 0)])
    return EdgeGraph(g.n, src, dst, et)


def gcn_norm(g: EdgeGraph) -> np.ndarray:
    """Per-edge weight 1/sqrt(deg(src) * deg(dst)) (Kipf & Welling)."""
    deg = np.bincount(g.dst, minlength=g.n).astype(np.float64)
    deg_s = np.bincount(g.src, minlength=g.n).astype(np.float64)
    deg = np.maximum(deg, 1.0)
    deg_s = np.maximum(deg_s, 1.0)
    return 1.0 / np.sqrt(deg_s[g.src] * deg[g.dst])


def adjacency_sets(g: EdgeGraph) -> list[set[int]]:
    """Neighbor sets (out-edges) for fast hop expansion on the driver."""
    adj: list[set[int]] = [set() for _ in range(g.n)]
    for s, d in zip(g.src, g.dst):
        adj[int(s)].add(int(d))
    return adj


def k_hop_nodes(adj: list[set[int]], seeds: list[int], k: int, cap: int = 200) -> set[int]:
    """Nodes within k hops of ``seeds`` (breadth-first, per-frontier cap)."""
    out = set(seeds)
    frontier = set(seeds)
    for _ in range(k):
        nxt: set[int] = set()
        for u in frontier:
            nxt |= adj[u]
        nxt -= out
        if len(nxt) > cap:
            nxt = set(sorted(nxt)[:cap])
        out |= nxt
        frontier = nxt
        if not frontier:
            break
    return out


def drnl_labels(
    adj: list[set[int]], nodes: list[int], u: int, v: int, max_label: int = 8
) -> np.ndarray:
    """Double-Radius Node Labeling (SEAL) restricted to ``nodes``.

    Label = 1 + min(d_u, d_v) + (d_u + d_v) capped at ``max_label``; the two
    endpoints get label 1. Distances are BFS within the induced subgraph.
    """
    node_set = set(nodes)

    def bfs(start: int) -> dict[int, int]:
        dist = {start: 0}
        frontier = [start]
        while frontier:
            nxt = []
            for x in frontier:
                for y in adj[x]:
                    if y in node_set and y not in dist:
                        dist[y] = dist[x] + 1
                        nxt.append(y)
            frontier = nxt
        return dist

    du, dv = bfs(u), bfs(v)
    labels = np.zeros(len(nodes), dtype=np.int64)
    for i, x in enumerate(nodes):
        if x == u or x == v:
            labels[i] = 1
            continue
        a, b = du.get(x), dv.get(x)
        if a is None or b is None:
            labels[i] = max_label
        else:
            labels[i] = min(1 + min(a, b) + a + b, max_label)
    return labels
