"""Cybersecurity monitoring (paper §8 + Exp-8).

Trojan detection is a *two-hop graph traversal* from known-infected
hosts; the paper reports 2,400× over the equivalent SQL, because the
traversal replaces two large self-joins with indexed adjacency hops.

We build the same comparison honestly in one process:

* :func:`trojan_graph` — host communication graph with a few infected
  seeds (labels Host / CONNECTS, ``infected`` flag).
* :func:`two_hop_traversal` — the Flex path: the Gremlin query
  ``g.V('Host').has('infected', 1).out('CONNECTS').out('CONNECTS')``
  compiled through GraphIR and executed on HiActor's CSR indexes.
* :func:`two_hop_sql` — the baseline: the equivalent double self-join
  as Spark SQL over the raw edge table (what the pre-GraphScope
  deployment ran).

Both return identical multisets of reachable hosts (oracle-checked).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.datasets import graphs
from repro.datasets.property_graph import PropertyGraph
from repro.query.gremlin import parse_gremlin
from repro.query.hiactor import HiActorEngine
from repro.query.planner import compile_plan


def trojan_graph(*, n_hosts: int = 2000, n_edges: int = 10000, n_infected: int = 5, seed: int = 0) -> PropertyGraph:
    e = graphs.rmat_edges(scale=int(np.ceil(np.log2(n_hosts))), n_edges=n_edges, seed=seed)
    dense, n = graphs.compact_ids(e)
    g = np.random.default_rng(seed + 1)
    infected = np.zeros(n, dtype=np.int64)
    infected[g.choice(n, size=min(n_infected, n), replace=False)] = 1
    pg = PropertyGraph()
    pg.add_vertices(
        "Host",
        pd.DataFrame({"id": np.arange(n, dtype=np.int64), "infected": infected}),
    )
    pg.add_edges("CONNECTS", dense, src_label="Host", dst_label="Host")
    return pg


GREMLIN_2HOP = "g.V('Host').has('infected',1).out('CONNECTS').out('CONNECTS').id()"


def two_hop_plan(pg: PropertyGraph):
    return compile_plan(parse_gremlin(GREMLIN_2HOP, pg.edge_signatures), rbo=True)


def two_hop_traversal(engine: HiActorEngine, plan) -> pd.DataFrame:
    """Flex path: indexed traversal on HiActor."""
    return engine.execute(plan)


def two_hop_sql(spark: SparkSession, pg: PropertyGraph) -> DataFrame:
    """Baseline: double self-join in Spark SQL over raw tables."""
    spark.createDataFrame(pg.vertices["Host"]).createOrReplaceTempView("cs_hosts")
    spark.createDataFrame(pg.edges["CONNECTS"]).createOrReplaceTempView("cs_edges")
    return spark.sql(
        """
        SELECT e2.dst AS id
        FROM cs_hosts h
        JOIN cs_edges e1 ON e1.src = h.id
        JOIN cs_edges e2 ON e2.src = e1.dst
        WHERE h.infected = 1
        """
    )
