"""Exp-2 — graph query performance (Fig. 7e-g).

(a) Query optimization: three query sets probing EdgeVertexFusion
    (paper: 2.9x), FilterPushIntoMatch (paper: 279x), CBO (paper: 11x).
(b) SNB Interactive (OLTP): HiActor-style indexed execution vs the
    scan-based baseline (TuGraph stand-in, DESIGN.md §5).
    Paper: 8.92x avg latency, 2.45x throughput (33,261 vs 13,532 ops/s).
(c) SNB BI (OLAP): Gaia with full optimization vs unoptimized plans
    (TigerGraph stand-in is the unoptimized-engine configuration).
    Paper: 10x average.
"""
import time
from concurrent.futures import ThreadPoolExecutor

import numpy as np
import pytest
from benchmarks._bench_utils import best_of, catalyst_pushdown_disabled, record

from repro.datasets import snb
from repro.query import snb_interactive as si
from repro.query.catalog import Catalog
from repro.query.cypher import parse_cypher
from repro.query.gaia import GaiaExecutor
from repro.query.planner import compile_plan, lower_match_naive, merge_matches
from repro.query.rbo import apply_rbo, fuse_edge_vertex, push_filters
from repro.storage.vineyard import VineyardStore


@pytest.fixture(scope="module")
def ctx(spark):
    pg = snb.snb_graph(n_persons=2000, seed=41)
    store = VineyardStore(spark, pg)
    return pg, store, GaiaExecutor(spark, store), Catalog.from_store(store)


# -- Exp-2a: RBO + CBO -------------------------------------------------------
Q1_FUSION = [  # traversal chains with id-only output: fusion removes vertex joins
    "MATCH (a:Person {city: 'beijing'})-[:KNOWS]->(b:Person)-[:KNOWS]->(c:Person) RETURN count(*) AS cnt",
    "MATCH (a:Person {city: 'paris'})-[:KNOWS]->(b:Person)-[:LIKES]->(p:Post) RETURN count(*) AS cnt",
    "MATCH (a:Account)-[:BUY]->(i:Item)<-[:BUY]-(s:Account) RETURN count(*) AS cnt",
    "MATCH (a:Person {city: 'tokyo'})-[:CREATED]->(p:Post) RETURN count(*) AS cnt",
]
Q2_PUSH = [  # highly selective predicates: pushing them gates the joins
    "MATCH (a:Person)-[:KNOWS]->(b:Person)-[:KNOWS]->(c:Person)-[:KNOWS]->(d:Person) WHERE a.name = 'p000042' RETURN count(*) AS cnt",
    "MATCH (a:Person)-[:KNOWS]->(b:Person)-[:KNOWS]->(c:Person)-[:LIKES]->(p:Post) WHERE a.name = 'p000007' RETURN count(*) AS cnt",
    "MATCH (a:Account)-[:AKNOWS]->(b:Account)-[:BUY]->(i:Item)<-[:BUY]-(s:Account) WHERE a.id = 3000000123 RETURN count(*) AS cnt",
    "MATCH (a:Person)-[:KNOWS]->(b:Person)-[:KNOWS]->(c:Person)-[:CREATED]->(p:Post) WHERE a.name = 'p001500' RETURN count(*) AS cnt",
]
Q3_CBO = [  # declaration order starts at the unselective side; CBO reorders
    """MATCH (a:Person)-[:KNOWS]->(b:Person)-[:LIKES]->(o:Post)
       MATCH (c:Person {name: 'p000100'})-[:KNOWS]->(a) RETURN count(*) AS cnt""",
    """MATCH (a:Person)-[:KNOWS]->(b:Person)-[:KNOWS]->(d:Person)
       MATCH (c:Person {name: 'p000200'})-[:KNOWS]->(a) RETURN count(*) AS cnt""",
    """MATCH (a:Account)-[:BUY]->(i:Item)<-[:BUY]-(x:Account)
       MATCH (s:Account {id: 3000000009})-[:AKNOWS]->(a) RETURN count(*) AS cnt""",
    """MATCH (p:Person)-[:KNOWS]->(r:Person)-[:CREATED]->(o:Post)
       MATCH (q:Person {name: 'p000300'})-[:KNOWS]->(p) RETURN count(*) AS cnt""",
]


def _run_set(gaia, plans):
    """Total seconds to execute a list of physical plans (results forced)."""

    def go():
        return [p_df.collect()[0][0] for p_df in (gaia.execute(p) for p in plans)]

    return best_of(2, go)


def test_exp2a_rbo_cbo(benchmark, ctx):
    pg, store, gaia, catalog = ctx

    def plans_for(queries, mode):
        out = []
        for q in queries:
            logical = parse_cypher(q)
            if mode == "none":
                out.append(compile_plan(logical, rbo=False, cbo=False))
            elif mode == "push_only":
                out.append(push_filters(compile_plan(logical, rbo=False, cbo=False)))
            elif mode == "push_fuse":
                out.append(apply_rbo(compile_plan(logical, rbo=False, cbo=False)))
            elif mode == "cbo":
                out.append(compile_plan(logical, catalog=catalog, rbo=True, cbo=True))
        return out

    def run():
        res = {}
        # Q1: fusion on/off (filters pushed in both -> isolates fusion)
        a = plans_for(Q1_FUSION, "push_only")
        b = plans_for(Q1_FUSION, "push_fuse")
        _run_set(gaia, a)  # warmup
        (ta, ra), (tb, rb) = _run_set(gaia, a), _run_set(gaia, b)
        assert ra == rb, "fusion changed results"
        res["EdgeVertexFusion"] = (ta, tb, 2.9)
        # Q2: filter pushdown on/off (no fusion in either).  The
        # no-push engine must also not get Catalyst's own pushdown,
        # else the baseline is silently optimized (see helper docstring).
        a = plans_for(Q2_PUSH, "none")
        b = plans_for(Q2_PUSH, "push_only")
        with catalyst_pushdown_disabled(gaia.spark):
            ta, ra = _run_set(gaia, a)
        tb, rb = _run_set(gaia, b)
        assert ra == rb, "pushdown changed results"
        res["FilterPushIntoMatch"] = (ta, tb, 279.0)
        # Q3: CBO on/off (RBO on in both)
        a = [apply_rbo(p) for p in plans_for(Q3_CBO, "none")]
        b = plans_for(Q3_CBO, "cbo")
        (ta, ra), (tb, rb) = _run_set(gaia, a), _run_set(gaia, b)
        assert ra == rb, "CBO changed results"
        res["CBO"] = (ta, tb, 11.0)
        return res

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    for name, (t_off, t_on, paper) in res.items():
        record(
            "Exp-2a: query optimization speedup (4 queries per set)",
            strategy=name,
            paper_speedup=f"{paper}x",
            unoptimized_s=f"{t_off:.2f}",
            optimized_s=f"{t_on:.2f}",
            measured_speedup=f"{t_off / t_on:.2f}x",
        )
        assert t_on < t_off * 1.05, f"{name} should not slow queries down"


# -- Exp-2b: SNB Interactive (OLTP) ------------------------------------------
def test_exp2b_snb_interactive(benchmark):
    pg = snb.snb_graph(n_persons=3000, seed=43)
    idx, scan = si.IndexedAccess(pg), si.ScanAccess(pg)
    persons = pg.vertices["Person"].id.to_numpy()
    rng = np.random.default_rng(5)
    sample = rng.choice(persons, 25, replace=False)

    def latencies(da):
        out = {}
        for qname, fn in {**si.COMPLEX, **si.SHORT}.items():
            t0 = time.perf_counter()
            for p in sample:
                if qname == "C1":
                    fn(da, int(p), "beijing")
                elif qname == "C2":
                    fn(da, int(p), 2500)
                elif qname == "S4":
                    fn(da, int(pg.vertices["Post"].id.iloc[0]))
                else:
                    fn(da, int(p))
            out[qname] = (time.perf_counter() - t0) / len(sample) * 1000
        return out

    def throughput(da, n_workers=8, n_ops=600):
        ops = si.make_workload(pg, n_ops=n_ops, seed=7)
        t0 = time.perf_counter()
        with ThreadPoolExecutor(n_workers) as ex:
            list(ex.map(lambda op: op[1](da), ops))
        return n_ops / (time.perf_counter() - t0)

    def run():
        lat_idx, lat_scan = latencies(idx), latencies(scan)
        tp_idx, tp_scan = throughput(idx), throughput(scan)
        return lat_idx, lat_scan, tp_idx, tp_scan

    lat_idx, lat_scan, tp_idx, tp_scan = benchmark.pedantic(run, rounds=1, iterations=1)
    speedups = []
    for q in lat_idx:
        s = lat_scan[q] / lat_idx[q]
        speedups.append(s)
        record(
            "Exp-2b: SNB Interactive latency, ms (Flex/HiActor vs scan baseline)",
            query=q,
            paper="Flex beats TuGraph on 28/29 queries (avg 8.92x)",
            flex_ms=f"{lat_idx[q]:.2f}",
            baseline_ms=f"{lat_scan[q]:.2f}",
            speedup=f"{s:.1f}x",
        )
    record(
        "Exp-2b: SNB Interactive throughput (ops/s)",
        paper="33,261 vs 13,532 (2.45x)",
        flex=f"{tp_idx:,.0f}",
        baseline=f"{tp_scan:,.0f}",
        ratio=f"{tp_idx / tp_scan:.2f}x",
        avg_latency_speedup=f"{np.mean(speedups):.1f}x",
    )
    assert tp_idx > tp_scan, "indexed OLTP should out-throughput scans"


# -- Exp-2c: SNB BI (OLAP) ---------------------------------------------------
BI_QUERIES = [
    """MATCH (p:Person)-[:KNOWS]->(q:Person)-[:LIKES]->(o:Post)
       WHERE p.city = 'beijing' RETURN q.city AS city, count(o) AS likes
       ORDER BY likes DESC LIMIT 5""",
    """MATCH (a:Person)-[:KNOWS]->(b:Person)-[:KNOWS]->(c:Person)-[:CREATED]->(p:Post)
       WHERE a.name = 'p000011'
       RETURN c.city AS city, avg(p.length) AS avg_len ORDER BY avg_len DESC LIMIT 5""",
    """MATCH (a:Account)-[:AKNOWS]->(b:Account)-[:BUY]->(i:Item)
       WHERE i.price > 480 AND a.riskScore > 0.9
       RETURN i.category AS cat, count(a) AS buyers ORDER BY buyers DESC LIMIT 5""",
    """MATCH (b:Person)-[:KNOWS]->(c:Person)-[:LIKES]->(p:Post)
       MATCH (a:Person {name: 'p000123'})-[:KNOWS]->(b) WHERE p.length > 1000
       RETURN c.city AS city, count(p) AS liked ORDER BY liked DESC, city ASC LIMIT 5""",
]


def test_exp2c_snb_bi(benchmark, ctx):
    pg, store, gaia, catalog = ctx

    def run():
        unopt = [compile_plan(parse_cypher(q), rbo=False, cbo=False) for q in BI_QUERIES]
        opt = [
            compile_plan(parse_cypher(q), catalog=catalog, rbo=True, cbo=True)
            for q in BI_QUERIES
        ]
        times = []
        for qi, (u, o) in enumerate(zip(unopt, opt)):
            ru = gaia.execute(u)
            ro = gaia.execute(o)
            assert [tuple(r) for r in ru.collect()] == [tuple(r) for r in ro.collect()]
            # baseline: unoptimized plans on an engine without pushdown
            with catalyst_pushdown_disabled(gaia.spark):
                tu, _ = best_of(2, lambda d=u: gaia.execute(d).collect())
            to, _ = best_of(2, lambda d=o: gaia.execute(d).collect())
            times.append((qi + 1, tu, to))
        return times

    times = benchmark.pedantic(run, rounds=1, iterations=1)
    ratios = []
    for qi, tu, to in times:
        ratios.append(tu / to)
        record(
            "Exp-2c: SNB BI latency, s (Gaia optimized vs unoptimized baseline)",
            query=f"BI-{qi}",
            paper="avg 10x vs TigerGraph (stand-in: unoptimized engine)",
            baseline_s=f"{tu:.2f}",
            flex_s=f"{to:.2f}",
            speedup=f"{tu / to:.2f}x",
        )
    record(
        "Exp-2c: SNB BI latency, s (Gaia optimized vs unoptimized baseline)",
        query="average",
        paper="10x",
        baseline_s="",
        flex_s="",
        speedup=f"{np.mean(ratios):.2f}x",
    )
