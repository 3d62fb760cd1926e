"""Real-time fraud detection (paper §8 + Exp-5 / Table 2).

Deployment per the paper: **GART** (dynamic store, orders stream in as
(Account)-[BUY]->(Item) edges) + **HiActor** (OLTP engine).  The check
for an account v against the fraud-seed set S:

    cnt1 = |{(s, item): v and s bought the same item within 5 days, s in S}|
    cnt2 = |{(s, item): a KNOWS-friend f of v and s co-bought, s in S}|
    alert  iff  w1*cnt1 + w2*cnt2 > threshold

(the Cypher of Fig. 6(a); our mini-Cypher lacks WITH-chaining, so the
stored procedure runs the two MATCH stages and combines them — exactly
how a registered stored procedure executes in the real system).

Correctness: :func:`fraud_check` (index-based stored procedure) is
oracle-checked against DuckDB SQL and against the IR path in tests.
Throughput: :func:`throughput_sweep` drives a process pool (true
parallelism, the actor-shard analog) — Table 2's worker sweep.
"""
from __future__ import annotations

import multiprocessing as mp
import time

import numpy as np

from repro.datasets import snb
from repro.datasets.property_graph import PropertyGraph
from repro.query.hiactor import HiActorEngine


def fraud_graph(*, n_accounts: int = 500, seed: int = 0, n_seeds: int = 25) -> tuple[PropertyGraph, np.ndarray]:
    """SNB-lite graph + a deterministic fraud-seed account set."""
    pg = snb.snb_graph(n_persons=n_accounts, seed=seed)
    g = np.random.default_rng(seed + 1)
    accounts = pg.vertices["Account"].id.to_numpy()
    seeds = np.sort(g.choice(accounts, size=min(n_seeds, len(accounts)), replace=False))
    return pg, seeds


class FraudDetector:
    """Stored-procedure implementation over HiActor's in-memory indexes."""

    def __init__(self, engine: HiActorEngine, seeds: np.ndarray,
                 *, w1: float = 1.0, w2: float = 0.5, threshold: float = 2.0,
                 window: int = 5):
        self.e = engine
        self.seeds = np.asarray(seeds)
        self.w1, self.w2, self.threshold, self.window = w1, w2, threshold, window

    def _co_purchases(self, account: int, *, with_window: bool) -> int:
        """Rows of (seed buyer, item) co-purchased with ``account``."""
        buy = self.e.adj[("BUY", "out")]
        rbuy = self.e.adj[("BUY", "in")]
        sl = buy.slice(account)
        items, dates = buy.nbrs[sl], buy.props["date"][sl]
        total = 0
        for item, d1 in zip(items, dates):
            bs = rbuy.slice(item)
            buyers, d2 = rbuy.nbrs[bs], rbuy.props["date"][bs]
            ok = np.isin(buyers, self.seeds) & (buyers != account)
            if with_window:
                ok &= np.abs(d2 - d1) < self.window
            total += int(ok.sum())
        return total

    def check(self, account: int) -> tuple[bool, int, int]:
        cnt1 = self._co_purchases(account, with_window=True)
        ak_out = self.e.adj[("AKNOWS", "out")]
        friends = np.unique(ak_out.neighbors(account))
        cnt2 = sum(
            self._co_purchases(int(f), with_window=False) for f in friends
        )
        score = self.w1 * cnt1 + self.w2 * cnt2
        return score > self.threshold, cnt1, cnt2


# -- Table 2 throughput harness ---------------------------------------------
_WORKER_STATE: dict = {}


def _init_worker(pg: PropertyGraph, seeds: np.ndarray, params: dict):
    # one engine per worker process (actor-shard locality)
    _WORKER_STATE["det"] = FraudDetector(HiActorEngine(pg), seeds, **params)
    _WORKER_STATE["accounts"] = pg.vertices["Account"].id.to_numpy()


def _worker_run(args) -> int:
    worker_id, duration = args
    det: FraudDetector = _WORKER_STATE["det"]
    accounts = _WORKER_STATE["accounts"]
    rng = np.random.default_rng(worker_id)
    end = time.perf_counter() + duration
    n = 0
    while time.perf_counter() < end:
        det.check(int(rng.choice(accounts)))
        n += 1
    return n


def throughput_sweep(
    pg: PropertyGraph,
    seeds: np.ndarray,
    *,
    worker_counts=(10, 20, 30, 40),
    duration: float = 2.0,
    params: dict | None = None,
) -> dict[int, float]:
    """ops/s for each worker count (Table 2's #threads sweep)."""
    params = params or {}
    out = {}
    ctx = mp.get_context("fork")
    for w in worker_counts:
        with ctx.Pool(w, initializer=_init_worker, initargs=(pg, seeds, params)) as pool:
            counts = pool.map(_worker_run, [(i, duration) for i in range(w)])
        out[w] = sum(counts) / duration
    return out


def stream_orders(gart_store, *, n_orders: int = 50, seed: int = 123) -> None:
    """Apply a stream of new BUY edges to a GART store (order ingestion)."""
    import pandas as pd

    g = np.random.default_rng(seed)
    accounts = gart_store._v_pdf["Account"].id.to_numpy()
    items = gart_store._v_pdf["Item"].id.to_numpy()
    for i in range(n_orders):
        gart_store.insert_edges(
            "BUY",
            pd.DataFrame(
                {
                    "src": [int(g.choice(accounts))],
                    "dst": [int(g.choice(items))],
                    "date": [3000 + i],
                    "amount": [float(g.random() * 100)],
                }
            ),
        )
