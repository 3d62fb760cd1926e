"""Exp-3 — graph analytics performance (Fig. 7h-k).

PageRank and BFS on scaled Graphalytics datasets.

CPU tier (Spark dataflow engines): GRAPE (all optimizations) vs the
PowerGraph-analog (per-edge scatter, no fragment reuse) and the
Gemini-analog (cached+combined, unpartitioned fragments).
Paper: GRAPE avg 25.1x / max 55.7x over PowerGraph; avg 2.3x / max
3.4x over Gemini.

GPU tier (vectorized kernels; no GPU in-container -> numpy proxies,
DESIGN.md §5): Flex-GPU (CSC segment reduction / frontier batches) vs
Groute-analog (chunked async scatter) and Gunrock-analog (atomic
scatter / edge-parallel frontier).  Paper: avg 3.3x over both, max
9.5x / 9.9x.
"""
import numpy as np
import pytest
from benchmarks._bench_utils import aqe_disabled, best_of, record

from repro.analytics import algorithms, gpu_backend, reference
from repro.analytics.baselines import CPU_SYSTEMS
from repro.datasets import graphalytics
from repro.storage.csr import NumpyCSR, StaticCSRStore

# CPU tier runs at 1/1000 of paper scale (1.0-1.8M edges) so
# per-superstep data volume dominates Spark's fixed job overhead; see
# DESIGN.md §5.
CPU_DATASETS = {"G500": 1000}
GPU_DATASETS = ["FB0", "G500", "TW", "CF"]
PR_ITERS = 3
BFS_CAP = 5


class _PlainEdgeStore(StaticCSRStore):
    """Topology as an unoptimized relation (no clustering, no cache).

    The comparator systems bring their own storage — handing them
    Vineyard's clustered+cached adjacency would silently grant them
    GRAPE's fragment management, nullifying the comparison.
    """

    def __init__(self, spark, edges):
        import pandas as pd

        self._spark = spark
        # one conversion to a JVM-side relation; every superstep re-scans
        # it (no clustering, no columnar cache) — "their own storage"
        self._df = spark.createDataFrame(
            edges[["src", "dst"]].assign(label=self._LABEL)
        )
        self._n_vertices = int(pd.concat([edges.src, edges.dst]).nunique())

    def adjacency(self, *, direction="out"):
        df = self._df
        if direction == "in":
            df = df.selectExpr("dst as src", "src as dst", "label")
        return df

    def edges(self, label, *, predicate=None):
        df = self.adjacency().select("src", "dst")
        return df.filter(predicate) if predicate else df

    def vertices(self, label, *, predicate=None):
        raise NotImplementedError


def test_exp3_cpu_systems(benchmark, spark):
    import gc

    edges = {
        d: graphalytics.generate(d, scale_divisor=div)
        for d, div in CPU_DATASETS.items()
    }

    def run():
        rows = {}
        with aqe_disabled(spark):
            for dname, e in edges.items():
                store = StaticCSRStore(spark, e)
                plain = _PlainEdgeStore(spark, e)
                src0 = int(e.src.iloc[0])
                for ename, factory in CPU_SYSTEMS.items():
                    # GRAPE runs over the GRIN store (clustered, cached
                    # fragments); the comparators over their own plain
                    # edge relation — the fragment-management delta.
                    eng = factory(
                        spark, store if ename.startswith("GraphScope") else plain
                    )
                    algorithms.pagerank(eng, num_iter=1).count()  # warmup
                    t_pr, _ = best_of(
                        2, lambda: algorithms.pagerank(eng, num_iter=PR_ITERS).count()
                    )
                    t_bfs, _ = best_of(
                        2,
                        lambda: algorithms.bfs(
                            eng, source=src0, max_iter=BFS_CAP
                        ).count(),
                    )
                    rows[(dname, ename)] = (t_pr, t_bfs)
                    del eng
                    gc.collect()  # release cached fragments + checkpoints
                store._adj.unpersist()
                store._v.unpersist()
                gc.collect()
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    for algo, idx in (("PageRank", 0), ("BFS", 1)):
        for dname in CPU_DATASETS:
            g = rows[(dname, "GraphScope Flex (GRAPE)")][idx]
            p = rows[(dname, "PowerGraph-analog")][idx]
            m = rows[(dname, "Gemini-analog")][idx]
            record(
                f"Exp-3 (CPU): {algo} runtime, s",
                dataset=dname,
                paper="GRAPE 25.1x avg vs PowerGraph; 2.3x avg vs Gemini",
                grape_s=f"{g:.2f}",
                powergraph_s=f"{p:.2f}",
                gemini_s=f"{m:.2f}",
                vs_powergraph=f"{p / g:.2f}x",
                vs_gemini=f"{m / g:.2f}x",
            )
    # ordering assertion: GRAPE strictly fastest on average
    avg = lambda name, idx: np.mean([rows[(d, name)][idx] for d in CPU_DATASETS])
    assert avg("GraphScope Flex (GRAPE)", 0) < avg("PowerGraph-analog", 0)
    assert avg("GraphScope Flex (GRAPE)", 1) < avg("PowerGraph-analog", 1)


def test_exp3_gpu_systems(benchmark):
    datasets = {d: graphalytics.generate(d) for d in GPU_DATASETS}

    def run():
        rows = {}
        for dname, e in datasets.items():
            s, d = e.src.to_numpy(), e.dst.to_numpy()
            n = int(max(s.max(), d.max())) + 1
            csr = NumpyCSR.from_edges(e, n)
            src0 = int(s[0])
            want_pr = reference.pagerank(s, d, n, num_iter=10)
            want_bfs = reference.bfs(s, d, n, src0)
            runs = {
                "FlexGPU": (
                    lambda: gpu_backend.flexgpu_pagerank(csr, num_iter=10),
                    lambda: gpu_backend.flexgpu_bfs(csr, src0),
                ),
                "Gunrock-analog": (
                    lambda: gpu_backend.gunrock_pagerank(s, d, n, num_iter=10),
                    lambda: gpu_backend.gunrock_bfs(s, d, n, src0),
                ),
                "Groute-analog": (
                    lambda: gpu_backend.groute_pagerank(s, d, n, num_iter=10),
                    lambda: gpu_backend.groute_bfs(s, d, n, src0),
                ),
            }
            for ename, (pr_fn, bfs_fn) in runs.items():
                t_pr, got_pr = best_of(3, pr_fn)
                t_bfs, got_bfs = best_of(3, bfs_fn)
                np.testing.assert_allclose(got_pr, want_pr, rtol=1e-8)
                np.testing.assert_array_equal(got_bfs, want_bfs)
                rows[(dname, ename)] = (t_pr, t_bfs)
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    for algo, idx in (("PageRank", 0), ("BFS", 1)):
        for dname in GPU_DATASETS:
            g = rows[(dname, "FlexGPU")][idx]
            gr = rows[(dname, "Groute-analog")][idx]
            gu = rows[(dname, "Gunrock-analog")][idx]
            record(
                f"Exp-3 (GPU-analog): {algo} runtime, ms",
                dataset=dname,
                paper="Flex-GPU 3.3x avg vs Groute & Gunrock",
                flexgpu_ms=f"{g * 1000:.1f}",
                groute_ms=f"{gr * 1000:.1f}",
                gunrock_ms=f"{gu * 1000:.1f}",
                vs_groute=f"{gr / g:.2f}x",
                vs_gunrock=f"{gu / g:.2f}x",
            )
    avg = lambda name, idx: np.mean([rows[(d, name)][idx] for d in GPU_DATASETS])
    # PR kernels converge to memory bandwidth in the numpy proxy (the
    # gather+scatter is the whole iteration); the chunked-async Groute
    # analog still pays loop overhead, and BFS shows the structural gap.
    assert avg("FlexGPU", 0) < avg("Groute-analog", 0)
    assert avg("FlexGPU", 1) < avg("Gunrock-analog", 1)
    assert avg("FlexGPU", 1) < avg("Groute-analog", 1)
