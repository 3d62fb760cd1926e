"""Decoupled sampling & training with asynchronous pipelining (§7).

The learning stack's two architectural claims, implemented for real:

* **Decoupling** — sampler workers and trainer workers are separate
  thread pools connected only by a bounded queue (the "sample
  channel"); either side scales independently
  (:func:`run_epoch`'s ``n_samplers`` / ``n_trainers``).
* **Asynchronous pipelining + prefetch** — samplers keep multiple
  batches in flight; trainers drain a prefetch cache so they never
  idle while a fetch is outstanding.

Threads give true overlap here because the heavy ops (numpy matmul /
feature gather / pickle) release the GIL.  Scale-out (Exp-4, Fig. 7m)
partitions the graph: each "node" owns a shard of samplers whose
feature gathers pay a real serialization cost for remote rows
(:class:`repro.learning.features.PartitionedFeatureStore`).
"""
from __future__ import annotations

import queue
import threading
import time
from dataclasses import dataclass

import numpy as np

from repro.learning.features import FeatureStore, PartitionedFeatureStore
from repro.learning.sage import GraphSAGE
from repro.learning.sampler import NumpySampler

_STOP = object()


@dataclass
class EpochStats:
    seconds: float
    n_batches: int
    loss: float
    acc: float


def run_epoch(
    *,
    sampler: NumpySampler,
    model: GraphSAGE,
    feature_store,
    labels: np.ndarray,
    seeds: np.ndarray,
    fanouts: list[int],
    batch_size: int = 256,
    n_samplers: int = 1,
    n_trainers: int = 1,
    prefetch: int = 4,
    partitioned_home: int | None = None,
    lr: float = 0.05,
) -> EpochStats:
    """One epoch over ``seeds`` with a decoupled sampler/trainer pool.

    ``feature_store`` is a :class:`FeatureStore` or, for the scale-out
    experiment, a :class:`PartitionedFeatureStore` (each sampler worker
    is assigned a home partition round-robin).
    """
    batches = [
        seeds[i : i + batch_size] for i in range(0, len(seeds), batch_size)
    ]
    task_q: queue.Queue = queue.Queue()
    for i, b in enumerate(batches):
        task_q.put((i, b))
    channel: queue.Queue = queue.Queue(maxsize=max(1, prefetch))
    lock = threading.Lock()
    totals = {"loss": 0.0, "acc": 0.0, "n": 0}

    def sample_worker(worker_id: int):
        rng_sampler = NumpySampler(sampler.csr, seed=worker_id + 1)
        home = (
            worker_id % feature_store.n_parts
            if isinstance(feature_store, PartitionedFeatureStore)
            else None
        )
        while True:
            try:
                _i, batch = task_q.get_nowait()
            except queue.Empty:
                break
            layers = rng_sampler.sample_batch(batch, fanouts)
            # feature collection happens on the *sampling* side (paper:
            # "subgraph sampling and feature collection" are the
            # sampler's job; trainers receive ready tensors)
            if home is not None:
                feats = [feature_store.gather(n, home) for n in layers]
            else:
                feats = [feature_store.gather(n) for n in layers]
            channel.put((batch, feats))

    def train_worker():
        while True:
            item = channel.get()
            if item is _STOP:
                break
            batch, feats = item
            loss, acc, grads = model.loss_and_grads(feats, labels[batch])
            with lock:  # parameter server analog: serialized updates
                model.step(grads, lr)
                totals["loss"] += loss * len(batch)
                totals["acc"] += acc * len(batch)
                totals["n"] += len(batch)

    t0 = time.perf_counter()
    samplers = [
        threading.Thread(target=sample_worker, args=(i,)) for i in range(n_samplers)
    ]
    trainers = [threading.Thread(target=train_worker) for _ in range(n_trainers)]
    for t in samplers + trainers:
        t.start()
    for t in samplers:
        t.join()
    for _ in trainers:
        channel.put(_STOP)
    for t in trainers:
        t.join()
    dt = time.perf_counter() - t0
    n = max(1, totals["n"])
    return EpochStats(dt, len(batches), totals["loss"] / n, totals["acc"] / n)
