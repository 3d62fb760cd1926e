"""Single-threaded numpy reference implementations (ground truth).

Used by tests to validate every distributed algorithm, and as the
shared correctness anchor for the vectorized "GPU backend" kernels.
All operate on dense-id edge arrays (src, dst in [0, n)).
"""
from __future__ import annotations

import numpy as np


def pagerank(src: np.ndarray, dst: np.ndarray, n: int, *, alpha: float = 0.85, num_iter: int = 10) -> np.ndarray:
    """Power iteration matching repro.analytics.algorithms.pagerank
    (no dangling redistribution)."""
    deg = np.bincount(src, minlength=n).astype(np.float64)
    rank = np.full(n, 1.0 / n)
    for _ in range(num_iter):
        contrib = np.where(deg > 0, rank / np.maximum(deg, 1), 0.0)
        incoming = np.zeros(n)
        np.add.at(incoming, dst, contrib[src])
        rank = (1 - alpha) / n + alpha * incoming
    return rank


def bfs(src: np.ndarray, dst: np.ndarray, n: int, source: int) -> np.ndarray:
    """Hop distances (directed); unreachable = -1."""
    indptr, indices = _csr(src, dst, n)
    dist = np.full(n, -1, dtype=np.int64)
    dist[source] = 0
    frontier = np.array([source])
    level = 0
    while len(frontier):
        level += 1
        nxt = np.concatenate(
            [indices[indptr[v] : indptr[v + 1]] for v in frontier]
        ) if len(frontier) else np.empty(0, dtype=np.int64)
        nxt = np.unique(nxt)
        nxt = nxt[dist[nxt] == -1]
        dist[nxt] = level
        frontier = nxt
    return dist


def sssp(src: np.ndarray, dst: np.ndarray, w: np.ndarray, n: int, source: int) -> np.ndarray:
    """Bellman-Ford; unreachable = +inf."""
    dist = np.full(n, np.inf)
    dist[source] = 0.0
    for _ in range(n):
        nd = dist.copy()
        np.minimum.at(nd, dst, dist[src] + w)
        if np.array_equal(nd, dist, equal_nan=True):
            break
        dist = nd
    return dist


def wcc(src: np.ndarray, dst: np.ndarray, n: int) -> np.ndarray:
    """Min-reachable-id component labels over the undirected closure."""
    label = np.arange(n, dtype=np.int64)
    changed = True
    while changed:
        nl = label.copy()
        np.minimum.at(nl, dst, label[src])
        np.minimum.at(nl, src, label[dst])
        changed = not np.array_equal(nl, label)
        label = nl
    return label


def triangle_count(src: np.ndarray, dst: np.ndarray, n: int) -> int:
    """Dense-adjacency triangle count (tiny graphs only)."""
    a = np.zeros((n, n), dtype=np.int64)
    a[src, dst] = 1
    a[dst, src] = 1
    np.fill_diagonal(a, 0)
    return int(np.trace(a @ a @ a) // 6)


def kcore_vertices(src: np.ndarray, dst: np.ndarray, n: int, k: int) -> np.ndarray:
    """Vertex ids of the undirected k-core (peeling)."""
    u = np.concatenate([src, dst])
    v = np.concatenate([dst, src])
    # dedupe the symmetrized pairs (reciprocal input edges would
    # otherwise double-count a neighbor)
    uv = np.unique(u * np.int64(n) + v)
    u, v = uv // n, uv % n
    alive = np.ones(n, dtype=bool)
    while True:
        mask = alive[u] & alive[v]
        deg = np.bincount(u[mask], minlength=n)
        drop = alive & (deg < k)
        if not drop.any():
            return np.flatnonzero(alive & (deg >= k))
        alive[drop] = False


def _csr(src: np.ndarray, dst: np.ndarray, n: int):
    order = np.argsort(src, kind="stable")
    indices = dst[order]
    counts = np.bincount(src, minlength=n)
    indptr = np.concatenate([[0], np.cumsum(counts)]).astype(np.int64)
    return indptr, indices
