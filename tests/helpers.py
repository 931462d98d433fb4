"""Shared test utilities: brute-force graph references and small-scale
dataset access (cached across test modules via the experiments cache).
"""
from __future__ import annotations

from collections import defaultdict

import numpy as np

from repro.core.hashing import edge_key
from repro.graphs.datasets import Stream

#: (dataset, scale) pairs small enough for exhaustive checks.
SMALL_SCALE = 0.15
SMALL_DATASETS = ["Twitter", "LiveJournal", "Flickr", "Wiki-Talk", "YouTube"]


def tiny_stream(n_nodes: int = 40, n_edges: int = 160, seed: int = 0) -> Stream:
    """A small dense-ish random stream for property tests."""
    g = np.random.default_rng(seed)
    u = g.integers(0, n_nodes, n_edges * 2)
    v = g.integers(0, n_nodes, n_edges * 2)
    lo, hi = np.minimum(u, v), np.maximum(u, v)
    keep = lo != hi
    lo, hi = lo[keep], hi[keep]
    _, idx = np.unique(lo * n_nodes + hi, return_index=True)
    idx.sort()
    lo, hi = lo[idx][:n_edges], hi[idx][:n_edges]
    perm = g.permutation(len(lo))
    lo, hi = lo[perm], hi[perm]
    t = np.arange(len(lo), dtype=np.int64)
    return Stream("tiny", t, lo.astype(np.int64), hi.astype(np.int64), edge_key(lo, hi))


def brute_force(stream: Stream) -> dict:
    """Exhaustive τ, τ_v, η, η_v and per-edge structures of a stream.

    Definitions follow the paper exactly: η counts unordered pairs of
    distinct triangles sharing an edge g with g not the last stream
    edge of either; η_v restricts both triangles to Δ_v (equivalently
    v ∈ g, see DESIGN.md).
    """
    tpos: dict[tuple[int, int], int] = {}
    adj: dict[int, set[int]] = defaultdict(set)
    for t, a, b in zip(stream.t.tolist(), stream.u.tolist(), stream.v.tolist()):
        adj[a].add(b)
        adj[b].add(a)
        tpos[(min(a, b), max(a, b))] = t

    tris = []  # (nodes asc, edges sorted by arrival)
    for (a, b) in tpos:
        for w in adj[a] & adj[b]:
            if w > b:
                e_ab = (a, b)
                e_aw = (min(a, w), max(a, w))
                e_bw = (min(b, w), max(b, w))
                by_time = sorted([(tpos[e], e) for e in (e_ab, e_aw, e_bw)])
                tris.append(((a, b, w), [e for _, e in by_time]))

    tau = len(tris)
    tau_v: dict[int, int] = defaultdict(int)
    nlast: dict[tuple[int, int], int] = defaultdict(int)
    for nodes, edges in tris:
        for v in nodes:
            tau_v[v] += 1
        nlast[edges[0]] += 1
        nlast[edges[1]] += 1
    eta = sum(n * (n - 1) // 2 for n in nlast.values())
    eta_v: dict[int, int] = defaultdict(int)
    for (a, b), n in nlast.items():
        pairs = n * (n - 1) // 2
        if pairs:
            eta_v[a] += pairs
            eta_v[b] += pairs
    return {
        "tau": tau,
        "tau_v": dict(tau_v),
        "eta": eta,
        "eta_v": dict(eta_v),
        "nlast": dict(nlast),
        "triangles": tris,
    }
