"""GART-analog: mutable in-memory graph store with MVCC (paper §4.2).

GART keeps a mutable CSR-like structure and serves *consistent
snapshots* identified by a version, updating under a monotonically
increasing ``write_version``.  The reproduction keeps the same reader
structure the paper credits for GART's read performance:

* a **compacted base** — the edge set live at ``base_version``, held as
  cached, src-clustered Spark frames (the mutable-CSR segment store);
* a small **delta** — inserts after ``base_version``, shipped to Spark
  per snapshot read; and
* **tombstones** — keys deleted after ``base_version``, subtracted from
  the base with an anti-join.

A read at version ``v`` is base ⊖ tombstones(≤v) ⊕ delta(≤v): cheap
when the delta is small (cost ≈ static CSR, Exp-1b's 73.5%), while the
LiveGraph baseline must resolve per-record version chains with a
shuffle on *every* scan.  ``compact()`` folds the delta into a new
base, exactly like GART's segment compaction.

The full MVCC edge log also lives in driver pandas — the source of
truth that snapshots and compaction are derived from, and the fast
path that :meth:`to_property_graph` hands to HiActor (the OLTP engine
reads GART directly in the fraud use case, Fig. 6(a)).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.datasets.property_graph import PropertyGraph
from repro.storage.grin import GraphStore, Trait

LIVE = np.iinfo(np.int64).max  # delete_version sentinel for live records


class GartStore(GraphStore):
    """Dynamic MVCC store. All reads go through a consistent snapshot."""

    name = "gart"

    def __init__(self, spark: SparkSession, pg: PropertyGraph, *, eager: bool = True):
        self._spark = spark
        self._signatures = dict(pg.edge_signatures)
        self._write_version = 0
        # vertex frames: mutable via append (MVCC kept edge-level, as in
        # GART's paper evaluation which is dominated by edge updates).
        self._v_pdf = {l: p.copy() for l, p in pg.vertices.items()}
        # edge MVCC log: per-label pandas with create/delete versions.
        self._log: dict[str, pd.DataFrame] = {
            l: p.assign(cv=np.int64(0), dv=np.int64(LIVE)) for l, p in pg.edges.items()
        }
        self._base_version = 0
        self._base_e: dict[str, DataFrame] = {}
        self._base_adj: DataFrame | None = None
        # (label, base_version, version) -> (tombstone DF, delta DF)
        self._delta_cache: dict[tuple, tuple] = {}
        self._rebuild_base(eager=eager)

    # ------------------------------------------------------------------
    # write path
    # ------------------------------------------------------------------
    @property
    def write_version(self) -> int:
        return self._write_version

    def insert_edges(self, label: str, pdf: pd.DataFrame) -> int:
        """Append edges at a new version; returns that version."""
        self._write_version += 1
        sl_dl = self._signatures.get(label)
        if sl_dl is None:
            raise KeyError(f"unknown edge label {label!r}")
        rows = pdf.copy()
        rows["cv"] = np.int64(self._write_version)
        rows["dv"] = np.int64(LIVE)
        self._log[label] = pd.concat([self._log[label], rows], ignore_index=True)
        return self._write_version

    def delete_edges(self, label: str, keys: pd.DataFrame) -> int:
        """Tombstone live (src, dst) records at a new version."""
        self._write_version += 1
        log = self._log[label]
        key = pd.MultiIndex.from_frame(keys[["src", "dst"]])
        mask = (
            pd.MultiIndex.from_frame(log[["src", "dst"]]).isin(key)
            & (log.dv == LIVE)
        )
        log.loc[mask, "dv"] = np.int64(self._write_version)
        return self._write_version

    def insert_vertices(self, label: str, pdf: pd.DataFrame) -> int:
        self._write_version += 1
        self._v_pdf[label] = pd.concat([self._v_pdf[label], pdf], ignore_index=True)
        return self._write_version

    def compact(self, *, eager: bool = True) -> None:
        """Fold delta+tombstones into a fresh base at the current version."""
        self._base_version = self._write_version
        self._rebuild_base(eager=eager)

    def _rebuild_base(self, *, eager: bool) -> None:
        vb = self._base_version
        for df in self._base_e.values():
            df.unpersist()
        if self._base_adj is not None:
            self._base_adj.unpersist()
        parts = []
        for label, log in self._log.items():
            live = log[(log.cv <= vb) & (log.dv > vb)].drop(columns=["cv", "dv"])
            sdf = self._spark.createDataFrame(live)
            self._base_e[label] = sdf.repartition("src").sortWithinPartitions("src").cache()
            parts.append(live[["src", "dst"]].assign(label=label))
        flat = pd.concat(parts, ignore_index=True)
        self._base_adj = (
            self._spark.createDataFrame(flat)
            .repartition("src")
            .sortWithinPartitions("src")
            .cache()
        )
        if eager:
            for df in self._base_e.values():
                df.count()
            self._base_adj.count()

    # ------------------------------------------------------------------
    # read path (GraphStore surface == latest consistent snapshot)
    # ------------------------------------------------------------------
    def traits(self) -> Trait:
        return (
            Trait.TOPOLOGY
            | Trait.PROPERTY
            | Trait.PARTITION
            | Trait.INDEX
            | Trait.PREDICATE_PUSHDOWN
            | Trait.MUTABLE
            | Trait.VERSIONED
        )

    def vertex_labels(self) -> list[str]:
        return list(self._v_pdf)

    def edge_labels(self) -> list[str]:
        return list(self._log)

    def edge_signature(self, label: str) -> tuple[str, str]:
        return self._signatures[label]

    def snapshot(self, version: int | None = None) -> "GartSnapshot":
        v = self._write_version if version is None else version
        if v < self._base_version:
            raise ValueError(
                f"version {v} precedes compacted base {self._base_version} "
                "(old versions are garbage-collected, as in GART)"
            )
        if v > self._write_version:
            raise ValueError(f"version {v} not yet written")
        return GartSnapshot(self, v)

    def vertices(self, label: str, *, predicate: str | None = None) -> DataFrame:
        return self.snapshot().vertices(label, predicate=predicate)

    def edges(self, label: str, *, predicate: str | None = None) -> DataFrame:
        return self.snapshot().edges(label, predicate=predicate)

    def adjacency(self, *, direction: str = "out") -> DataFrame:
        return self.snapshot().adjacency(direction=direction)

    def scan_edges(self) -> DataFrame:
        return self.snapshot().scan_edges()

    # pandas view of one consistent snapshot (HiActor / sampler fast path)
    def to_property_graph(self, version: int | None = None) -> PropertyGraph:
        v = self._write_version if version is None else version
        pg = PropertyGraph()
        for label, pdf in self._v_pdf.items():
            pg.add_vertices(label, pdf)
        for label, log in self._log.items():
            live = log[(log.cv <= v) & (log.dv > v)].drop(columns=["cv", "dv"])
            sl, dl = self._signatures[label]
            pg.add_edges(label, live, src_label=sl, dst_label=dl)
        return pg


class GartSnapshot(GraphStore):
    """Consistent read view at one version: base ⊖ tombstones ⊕ delta."""

    name = "gart"

    def __init__(self, store: GartStore, version: int):
        self._s = store
        self.version = version

    def traits(self) -> Trait:
        return self._s.traits()

    def vertex_labels(self) -> list[str]:
        return self._s.vertex_labels()

    def edge_labels(self) -> list[str]:
        return self._s.edge_labels()

    def edge_signature(self, label: str) -> tuple[str, str]:
        return self._s.edge_signature(label)

    def vertices(self, label: str, *, predicate: str | None = None) -> DataFrame:
        df = self._s._spark.createDataFrame(self._s._v_pdf[label])
        return df.filter(predicate) if predicate else df

    def _resolved(self, label: str, cols_with_props: bool) -> DataFrame:
        """Edge set of ``label`` live at ``self.version`` as a Spark DF.

        Tombstones are applied with a *broadcast* anti-join: in GART
        they are a small in-memory set checked inline during the scan,
        so the scan must not pay a shuffle for them.  The delta/tomb
        frames are memoized per (label, version) — GART keeps the delta
        resident; it is not re-shipped on every read.
        """
        s, v, vb = self._s, self.version, self._s._base_version
        key = (label, vb, v)
        cached = s._delta_cache.get(key)
        if cached is None:
            log = s._log[label]
            tomb = log[(log.cv <= vb) & (log.dv > vb) & (log.dv <= v)][["src", "dst"]]
            delta = log[(log.cv > vb) & (log.cv <= v) & (log.dv > v)].drop(
                columns=["cv", "dv"]
            )
            tomb_df = s._spark.createDataFrame(tomb).cache() if len(tomb) else None
            delta_df = s._spark.createDataFrame(delta).cache() if len(delta) else None
            for df in (tomb_df, delta_df):
                if df is not None:
                    df.count()
            cached = (tomb_df, delta_df)
            s._delta_cache[key] = cached
        tomb_df, delta_df = cached
        base = s._base_e[label]
        if tomb_df is not None:
            base = base.join(F.broadcast(tomb_df), on=["src", "dst"], how="left_anti")
        if delta_df is not None:
            base = base.unionByName(delta_df)
        if not cols_with_props:
            base = base.select("src", "dst")
        return base

    def edges(self, label: str, *, predicate: str | None = None) -> DataFrame:
        df = self._resolved(label, cols_with_props=True)
        return df.filter(predicate) if predicate else df

    def adjacency(self, *, direction: str = "out") -> DataFrame:
        parts = [
            self._resolved(l, cols_with_props=False).withColumn("label", F.lit(l))
            for l in self.edge_labels()
        ]
        out = parts[0]
        for p in parts[1:]:
            out = out.unionByName(p)
        if direction == "in":
            out = out.selectExpr("dst as src", "src as dst", "label")
        return out

    def scan_edges(self) -> DataFrame:
        return self.adjacency()
