"""PIE model: subgraph-centric programming (paper §6, Fan et al. TODS'18).

PIE runs a *sequential* algorithm on each fragment (PEval), exchanges
border messages, then incrementally re-evaluates (IncEval) until no
messages flow — GRAPE's auto-parallelization of sequential code.

Spark mapping: fragments are hash partitions of the edge list; PEval /
IncEval are plain-pandas functions executed fragment-parallel via
``cogroup().applyInPandas`` (the partition-at-a-time escape hatch that
corresponds to PIE's "handle a partition as a primary element").
Message routing between fragments is a repartition on the owner id.
"""
from __future__ import annotations

from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.storage.grin import GraphStore

PEvalFn = Callable[[pd.DataFrame, pd.DataFrame], tuple[pd.DataFrame, pd.DataFrame]]
IncEvalFn = Callable[[pd.DataFrame, pd.DataFrame, pd.DataFrame], tuple[pd.DataFrame, pd.DataFrame]]


class PIEEngine:
    """Fragment-parallel PEval/IncEval runtime.

    ``peval(edges_pdf, state_pdf)`` and
    ``inceval(edges_pdf, state_pdf, msgs_pdf)`` both return
    ``(new_state_pdf, out_msgs_pdf)`` where messages are (id, mvalue)
    rows addressed to *any* vertex (the engine routes them to the
    owning fragment).  State rows are (id, value) for the fragment's
    own vertices.
    """

    def __init__(
        self,
        spark: SparkSession,
        store: GraphStore,
        *,
        num_fragments: int = 4,
        edge_weight: str | None = None,
    ):
        self.spark = spark
        self.nfrag = num_fragments
        if edge_weight is None:
            edges = store.adjacency().select("src", "dst", F.lit(1.0).alias("weight"))
        else:
            parts = [
                store.edges(l).select("src", "dst", F.col(edge_weight).alias("weight"))
                for l in store.edge_labels()
            ]
            edges = parts[0]
            for p in parts[1:]:
                edges = edges.unionByName(p)
        # a fragment owns the edges whose src it owns
        self.edges = edges.withColumn(
            "frag", F.pmod(F.col("src"), F.lit(self.nfrag))
        ).cache()
        self.edges.count()
        self.vertices = (
            edges.select(F.col("src").alias("id"))
            .unionByName(edges.select(F.col("dst").alias("id")))
            .distinct()
            .withColumn("frag", F.pmod(F.col("id"), F.lit(self.nfrag)))
            .cache()
        )
        self.vertices.count()

    def run(
        self,
        *,
        initial: DataFrame,  # (id, value)
        peval: PEvalFn,
        inceval: IncEvalFn,
        max_rounds: int = 30,
    ) -> DataFrame:
        state = initial.join(self.vertices.select("id", "frag"), "id")
        msgs = None
        schema = "id long, value double, kind string, frag long"

        nfrag = self.nfrag  # captured by value: the closure must not
        # reference ``self`` (it would drag the SparkSession to workers)

        def make_round(fn, with_msgs: bool):
            def round_fn(_key, edges_pdf: pd.DataFrame, sm_pdf: pd.DataFrame):
                st = sm_pdf[sm_pdf.kind == "state"][["id", "value"]]
                if with_msgs:
                    mg = sm_pdf[sm_pdf.kind == "msg"][["id", "value"]]
                    new_state, out = fn(edges_pdf, st, mg)
                else:
                    new_state, out = fn(edges_pdf, st)
                res = new_state.assign(kind="state")
                res["frag"] = (res.id % nfrag).astype("int64")
                if len(out):
                    om = out.assign(kind="msg")
                    om["frag"] = (om.id % nfrag).astype("int64")
                    res = pd.concat([res, om], ignore_index=True)
                return res[["id", "value", "kind", "frag"]]

            return round_fn

        for rnd in range(max_rounds):
            sm = state.select("id", F.col("value").cast("double"), F.lit("state").alias("kind"), "frag")
            if msgs is not None:
                sm = sm.unionByName(msgs)
            fn = make_round(peval, False) if rnd == 0 else make_round(inceval, True)
            combined = (
                self.edges.groupby("frag")
                .cogroup(sm.groupby("frag"))
                .applyInPandas(fn, schema)
                .localCheckpoint(eager=True)
            )
            state = combined.filter("kind = 'state'").select("id", "value", "frag")
            msgs = combined.filter("kind = 'msg'").select("id", "value", "kind", "frag")
            if rnd > 0 and msgs.limit(1).count() == 0:
                break
        return state.select("id", "value")


def sssp_pie(engine: PIEEngine, *, source: int) -> DataFrame:
    """PIE SSSP: sequential Bellman-Ford per fragment + border exchange.

    The paper's canonical PIE example (PEval = local shortest paths,
    IncEval = incremental relaxation from border updates).  Returns
    (id, dist) with unreachable = +inf.
    """

    def local_relax(edges: pd.DataFrame, dist: dict[int, float]) -> tuple[dict, dict]:
        # run Bellman-Ford over this fragment's edges until fixpoint
        out_updates: dict[int, float] = {}
        if not len(edges):
            return dist, out_updates
        s = edges.src.to_numpy()
        d = edges.dst.to_numpy()
        w = edges.weight.to_numpy()
        get = np.vectorize(lambda v: dist.get(v, np.inf))
        for _ in range(len(edges) + 1):
            ds = get(s)
            dd = get(d)
            cand = ds + w
            better = cand < dd
            if not better.any():
                break
            for t, c in zip(d[better], cand[better]):
                if c < dist.get(t, np.inf):
                    dist[int(t)] = float(c)
                    out_updates[int(t)] = float(c)
        return dist, out_updates

    def peval(edges: pd.DataFrame, state: pd.DataFrame):
        dist = dict(zip(state.id.astype(int), state.value))
        dist = {k: (0.0 if k == source else np.inf) for k in dist}
        dist, updates = local_relax(edges, dist)
        own = set(state.id.astype(int))
        new_state = pd.DataFrame(
            {"id": list(own), "value": [dist.get(i, np.inf) for i in own]}
        )
        border = {k: v for k, v in updates.items() if k not in own}
        msgs = pd.DataFrame({"id": list(border), "value": list(border.values())})
        return new_state, msgs

    def inceval(edges: pd.DataFrame, state: pd.DataFrame, msgs: pd.DataFrame):
        dist = dict(zip(state.id.astype(int), state.value))
        own = set(state.id.astype(int))
        improved = False
        for mid, mv in zip(msgs.id.astype(int), msgs.value):
            if mv < dist.get(mid, np.inf):
                dist[mid] = float(mv)
                improved = True
        updates: dict[int, float] = {}
        if improved:
            dist, updates = local_relax(edges, dist)
        new_state = pd.DataFrame(
            {"id": list(own), "value": [dist.get(i, np.inf) for i in own]}
        )
        border = {k: v for k, v in updates.items() if k not in own}
        msgs_out = pd.DataFrame({"id": list(border), "value": list(border.values())})
        return new_state, msgs_out

    init = engine.vertices.select(
        "id", F.when(F.col("id") == source, 0.0).otherwise(float("inf")).alias("value")
    )
    return engine.run(initial=init, peval=peval, inceval=inceval).withColumnRenamed(
        "value", "dist"
    )
