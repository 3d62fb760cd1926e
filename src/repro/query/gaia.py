"""Gaia-analog: data-parallel OLAP execution of GraphIR (paper §5.3).

The code generator maps each physical IR operator onto the Catalyst
dataflow: Scan -> SOURCE (filtered vertex relation), ExpandEdge /
ExpandVertex -> FLATMAP (join against the edge relation), GetVertex ->
join against the vertex relation, Project -> MAP, and the relational
tail (Select/GroupBy/OrderBy/Limit) onto the matching DataFrame ops.

Alias binding convention: an alias ``a`` occupies columns ``a_id`` and
``a_<prop>``; edge alias ``e`` occupies ``e_<prop>`` plus ``e_nbr``
(the far endpoint, consumed by GetVertex/fusion).

Predicate placement is decided by the *plan* (RBO), and the executor
additionally pushes predicates into the storage scan when the backend
advertises the GRIN PREDICATE_PUSHDOWN trait.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.query import ir
from repro.storage.grin import GraphStore, Trait


class GaiaExecutor:
    """Executes a *physical* plan (no Match nodes) against one store."""

    def __init__(self, spark: SparkSession, store: GraphStore):
        self.spark = spark
        self.store = store
        self._pushdown = store.supports(Trait.PREDICATE_PUSHDOWN)

    # -- relation builders ---------------------------------------------
    def _vertex_rel(self, label: str, alias: str, predicate) -> DataFrame:
        sql = ir.predicate_sql(predicate, prefixed=False)
        if sql and self._pushdown:
            df = self.store.vertices(label, predicate=sql)
        else:
            df = self.store.vertices(label)
            if sql:
                df = df.filter(sql)
        return df.select(
            [F.col("id").alias(f"{alias}_id")]
            + [F.col(c).alias(f"{alias}_{c}") for c in df.columns if c != "id"]
        )

    def _edge_rel(self, label: str, edge_alias: str, direction: str, predicate) -> DataFrame:
        sql = ir.predicate_sql(predicate, prefixed=False)
        if sql and self._pushdown:
            df = self.store.edges(label, predicate=sql)
        else:
            df = self.store.edges(label)
            if sql:
                df = df.filter(sql)
        props = [c for c in df.columns if c not in ("src", "dst")]

        def orient(d: DataFrame, near: str, far: str) -> DataFrame:
            return d.select(
                [F.col(near).alias("_near"), F.col(far).alias(f"{edge_alias}_nbr")]
                + [F.col(c).alias(f"{edge_alias}_{c}") for c in props]
            )

        if direction == "out":
            return orient(df, "src", "dst")
        if direction == "in":
            return orient(df, "dst", "src")
        if direction == "both":
            return orient(df, "src", "dst").unionByName(orient(df, "dst", "src"))
        raise ValueError(f"bad direction {direction!r}")

    # -- plan execution -------------------------------------------------
    def execute(self, plan) -> DataFrame:
        df: DataFrame | None = None
        for op in plan:
            df = self._apply(df, op)
        if df is None:
            raise ValueError("empty plan")
        return df

    def _apply(self, df: DataFrame | None, op) -> DataFrame:
        if isinstance(op, ir.Scan):
            rel = self._vertex_rel(op.label, op.alias, op.predicate)
            return rel if df is None else df.crossJoin(rel)
        if isinstance(op, ir.ExpandEdge):
            if df is None:
                raise ValueError("ExpandEdge needs a bound input")
            rel = self._edge_rel(op.edge_label, op.edge_alias, op.direction, op.predicate)
            return df.join(
                rel, on=df[f"{op.from_alias}_id"] == rel["_near"], how="inner"
            ).drop("_near")
        if isinstance(op, ir.GetVertex):
            rel = self._vertex_rel(op.label, op.alias, op.predicate)
            out = df.join(
                rel,
                on=df[f"{op.edge_alias}_nbr"] == rel[f"{op.alias}_id"],
                how="inner",
            )
            return out.drop(f"{op.edge_alias}_nbr")
        if isinstance(op, ir.ExpandVertex):
            rel = self._edge_rel(op.edge_label, f"__fused_{op.alias}", op.direction, op.predicate)
            rel = rel.withColumnRenamed(f"__fused_{op.alias}_nbr", f"{op.alias}_id")
            keep = ["_near", f"{op.alias}_id"]
            rel = rel.select(keep)
            return df.join(
                rel, on=df[f"{op.from_alias}_id"] == rel["_near"], how="inner"
            ).drop("_near")
        if isinstance(op, ir.Join):
            left = self.execute(op.left)
            right = self.execute(op.right)
            keys = sorted(set(left.columns) & set(right.columns))
            return left.join(right, on=keys, how="inner")
        if isinstance(op, ir.Select):
            return df.filter(ir.predicate_sql(op.predicate, prefixed=True))
        if isinstance(op, ir.Project):
            cols = [F.col(e.ref.column).alias(e.name) for e in op.exprs]
            out = df.select(cols)
            return out.distinct() if op.distinct else out
        if isinstance(op, ir.GroupBy):
            keys = [F.col(e.ref.column).alias(e.name) for e in op.keys]
            aggs = []
            for a in op.aggs:
                if a.fn == "count" and a.ref is None:
                    aggs.append(F.count(F.lit(1)).alias(a.name))
                else:
                    aggs.append(getattr(F, a.fn)(F.col(a.ref.column)).alias(a.name))
            return df.groupBy(keys).agg(*aggs)
        if isinstance(op, ir.OrderBy):
            cols = [F.col(n).asc() if asc else F.col(n).desc() for n, asc in op.keys]
            return df.orderBy(cols)
        if isinstance(op, ir.Limit):
            return df.limit(op.n)
        if isinstance(op, ir.Count):
            return df.agg(F.count(F.lit(1)).alias(op.name))
        raise TypeError(f"unexecutable op {op!r} (Match must be lowered first)")
