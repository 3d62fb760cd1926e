"""Feature store for the learning stack.

The paper's sampling servers perform "subgraph sampling and feature
collection"; features live with the graph store.  Here features are a
deterministic seeded matrix (the stand-in for OGB node features, which
are not downloadable in-container), plus synthetic labels derived from
graph structure so supervised training has a real signal.

:class:`PartitionedFeatureStore` models the *distributed* feature
fetch of scale-out training: rows live in per-partition arrays, and a
remote fetch pays a real serialization round-trip (pickle) — the
honest substitute for the network hop, whose cost the asynchronous
pipeline is supposed to hide (Exp-4 scale-out).
"""
from __future__ import annotations

import pickle

import numpy as np


def make_features(n: int, dim: int, *, seed: int = 0) -> np.ndarray:
    g = np.random.default_rng(seed)
    return g.standard_normal((n, dim)).astype(np.float32)


def make_labels(src: np.ndarray, dst: np.ndarray, n: int, n_classes: int = 4) -> np.ndarray:
    """Structure-derived labels: bucketed out-degree (learnable from
    neighborhoods, unlike pure-random labels)."""
    deg = np.bincount(src, minlength=n)
    ranks = np.argsort(np.argsort(deg))
    return (ranks * n_classes // max(1, n)).clip(0, n_classes - 1).astype(np.int64)


class FeatureStore:
    """Single-node store: plain array gather."""

    def __init__(self, feats: np.ndarray):
        self.feats = feats

    def gather(self, nodes: np.ndarray) -> np.ndarray:
        return self.feats[nodes]


class PartitionedFeatureStore:
    """Features sharded over ``n_parts`` "nodes" (id % n_parts).

    ``gather(nodes, home)`` serves local rows by direct slice and
    remote rows through a pickle round-trip (serialization cost that a
    real RPC would pay), then reassembles in request order.
    """

    def __init__(self, feats: np.ndarray, n_parts: int):
        self.n_parts = n_parts
        self.dim = feats.shape[1]
        self.parts = []
        self.local_index = np.empty(len(feats), dtype=np.int64)
        for p in range(n_parts):
            ids = np.flatnonzero(np.arange(len(feats)) % n_parts == p)
            self.local_index[ids] = np.arange(len(ids))
            self.parts.append(feats[ids].copy())

    def gather(self, nodes: np.ndarray, home: int) -> np.ndarray:
        out = np.empty((len(nodes), self.dim), dtype=np.float32)
        owner = nodes % self.n_parts
        for p in range(self.n_parts):
            mask = owner == p
            if not mask.any():
                continue
            rows = self.parts[p][self.local_index[nodes[mask]]]
            if p != home:  # remote fetch: serialization round-trip
                rows = pickle.loads(pickle.dumps(rows, protocol=5))
            out[mask] = rows
        return out
