"""Seeded synthetic graph generators (RMAT power-law, uniform).

The paper evaluates on billion-edge public graphs (Graphalytics datagen,
SNAP crawls, WebGraph, OGB).  In-container we regenerate scaled-down
synthetic equivalents with the matching *skew class*: RMAT for
social/web crawls (heavy-tailed degrees) and uniform (Erdős–Rényi-ish)
for graph500-style generators.  All generators are deterministic in
``seed`` so the DuckDB oracle and repeated benchmark runs see identical
input.

Outputs are pandas DataFrames with ``int64`` vertex ids in
``[0, n_vertices)``; use :func:`to_spark_edges` for a Spark DataFrame.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def rmat_edges(
    *,
    scale: int,
    n_edges: int,
    a: float = 0.57,
    b: float = 0.19,
    c: float = 0.19,
    seed: int = 0,
    dedupe: bool = True,
    drop_self_loops: bool = True,
) -> pd.DataFrame:
    """Power-law edge list via the RMAT recursive quadrant process.

    ``scale`` gives ``2**scale`` vertices.  Probabilities (a, b, c, d)
    follow the Graph500 convention (d = 1 - a - b - c).  Vectorized
    over all edges per bit-level, so generation is O(scale * n_edges)
    numpy work.
    """
    if not 0 < a + b + c <= 1:
        raise ValueError("require 0 < a+b+c <= 1")
    g = np.random.default_rng(seed)
    src = np.zeros(n_edges, dtype=np.int64)
    dst = np.zeros(n_edges, dtype=np.int64)
    for _ in range(scale):
        r = g.random(n_edges)
        # quadrants: a=(0,0), b=(0,1), c=(1,0), d=(1,1)
        src_bit = (r >= a + b).astype(np.int64)
        dst_bit = (((r >= a) & (r < a + b)) | (r >= a + b + c)).astype(np.int64)
        src = (src << 1) | src_bit
        dst = (dst << 1) | dst_bit
    pdf = pd.DataFrame({"src": src, "dst": dst})
    if drop_self_loops:
        pdf = pdf[pdf.src != pdf.dst]
    if dedupe:
        pdf = pdf.drop_duplicates()
    return pdf.reset_index(drop=True)


def uniform_edges(
    *,
    n_vertices: int,
    n_edges: int,
    seed: int = 0,
    dedupe: bool = True,
    drop_self_loops: bool = True,
) -> pd.DataFrame:
    """Uniform random edge list over ``n_vertices`` vertices."""
    g = np.random.default_rng(seed)
    pdf = pd.DataFrame(
        {
            "src": g.integers(0, n_vertices, n_edges),
            "dst": g.integers(0, n_vertices, n_edges),
        }
    )
    if drop_self_loops:
        pdf = pdf[pdf.src != pdf.dst]
    if dedupe:
        pdf = pdf.drop_duplicates()
    return pdf.reset_index(drop=True)


def with_weights(edges: pd.DataFrame, *, seed: int = 0, low: float = 0.0, high: float = 1.0) -> pd.DataFrame:
    """Attach a deterministic ``weight`` column (for SSSP / equity graphs)."""
    g = np.random.default_rng(seed)
    out = edges.copy()
    out["weight"] = g.uniform(low, high, len(edges)).round(6)
    return out


def compact_ids(edges: pd.DataFrame) -> tuple[pd.DataFrame, int]:
    """Relabel vertex ids to a dense ``[0, n)`` range.

    RMAT leaves many ids unused; analytics kernels (CSR) want dense ids.
    Returns the relabeled edges and the number of distinct vertices.
    """
    ids = np.unique(np.concatenate([edges.src.to_numpy(), edges.dst.to_numpy()]))
    lookup = pd.Series(np.arange(len(ids), dtype=np.int64), index=ids)
    out = pd.DataFrame(
        {
            "src": lookup[edges.src.to_numpy()].to_numpy(),
            "dst": lookup[edges.dst.to_numpy()].to_numpy(),
        }
    )
    for c in edges.columns:
        if c not in ("src", "dst"):
            out[c] = edges[c].to_numpy()
    return out, len(ids)


def to_spark_edges(spark: SparkSession, edges: pd.DataFrame) -> DataFrame:
    """pandas edge list -> Spark DataFrame (Arrow path)."""
    return spark.createDataFrame(edges)


def num_vertices(edges: pd.DataFrame) -> int:
    """Distinct endpoint count of an edge list."""
    return int(
        len(np.unique(np.concatenate([edges.src.to_numpy(), edges.dst.to_numpy()])))
    )
