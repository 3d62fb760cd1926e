"""NCN (Neural Common Neighbor) sampling + link prediction (Fig. 6(c)).

The social-relation-prediction use case trains NCN: for every training
edge (u, v), the sampler extracts the *first-order common neighbors*
of u and v and performs k-hop subgraph sampling around each common
neighbor.  The scorer combines u/v embeddings with the aggregated
common-neighbor embeddings — the structural part of NCN that drives
its sampling cost profile (which is what Exp-7 measures).

Common-neighbor extraction is vectorized over the CSR with sorted-array
intersections; tests oracle-check it against a DuckDB self-join.
"""
from __future__ import annotations

import numpy as np

from repro.learning.sage import GraphSAGE
from repro.learning.sampler import NumpySampler
from repro.storage.csr import NumpyCSR


def common_neighbors(csr: NumpyCSR, u: int, v: int) -> np.ndarray:
    """Sorted common out-neighbors of u and v."""
    return np.intersect1d(csr.neighbors(u), csr.neighbors(v))


def sample_ncn_batch(
    sampler: NumpySampler,
    edges: np.ndarray,  # (B, 2) training edges
    fanouts: list[int],
    *,
    max_cn: int = 8,
):
    """Per training edge: (u, v, common neighbors[<=max_cn], and the
    layered k-hop samples rooted at those common neighbors)."""
    csr = sampler.csr
    out = []
    for u, v in edges:
        cn = common_neighbors(csr, int(u), int(v))[:max_cn]
        roots = cn if len(cn) else np.array([int(u), int(v)], dtype=np.int64)
        layers = sampler.sample_batch(roots, fanouts)
        out.append((int(u), int(v), cn, layers))
    return out


def negative_edges(csr: NumpyCSR, n: int, *, seed: int = 0) -> np.ndarray:
    """Random non-edges (approximate negatives) for link prediction."""
    g = np.random.default_rng(seed)
    out = []
    existing = set(zip(csr.src_sorted.tolist(), csr.indices.tolist()))
    while len(out) < n:
        u = int(g.integers(0, csr.n))
        v = int(g.integers(0, csr.n))
        if u != v and (u, v) not in existing:
            out.append((u, v))
    return np.array(out, dtype=np.int64)


def ncn_score(
    model: GraphSAGE,
    store,
    samples,
) -> np.ndarray:
    """NCN link score per sampled edge: sigmoid(<h_u, h_v> + sum_cn <h_u+h_v, h_cn>).

    Embeddings come from a SAGE forward over each edge's common-neighbor
    subgraph (the trained encoder); u/v embeddings use raw features
    projected by the model's first self-weight (cheap anchor encoding).
    """
    scores = np.empty(len(samples))
    w = model.p.w_self[0]
    for i, (u, v, cn, layers) in enumerate(samples):
        feats = [store.gather(n) for n in layers]
        logits, (cache, h_top) = model.forward(feats)
        hu = store.gather(np.array([u]))[0] @ w
        hv = store.gather(np.array([v]))[0] @ w
        base = float(hu @ hv)
        if len(cn):
            h_cn = h_top[: len(cn)]
            base += float(((hu + hv) @ h_cn.T).sum() / max(1, len(cn)))
        scores[i] = 1.0 / (1.0 + np.exp(-base / (1 + abs(base))))
    return scores
