"""HiActor-analog: high-concurrency OLTP execution of GraphIR (§5.3).

HiActor executes small point-lookup-ish queries on actor shards over
in-memory state — latency is microseconds, throughput comes from many
concurrent actors.  The analog here: a driver-local engine holding

* per-label property tables indexed by vertex id, and
* per-(edge label, direction) CSR-style adjacency (sorted arrays +
  ``searchsorted`` slicing) including edge properties,

built once from any GRIN store's :meth:`to_property_graph` view (the
Vineyard/GART zero-copy sharing path).  The same physical plans Gaia
runs distributed execute here row-at-a-time (vectorized per query);
tests assert both engines return identical rows.

Concurrency: :func:`serve_threadpool` measures sustained throughput
with a worker pool, the analog of HiActor's shard-per-core loop.  The
fraud benchmark uses a process pool (true parallelism) — see
``repro.usecases.fraud``.
"""
from __future__ import annotations

from concurrent.futures import ThreadPoolExecutor

import numpy as np
import pandas as pd

from repro.datasets.property_graph import PropertyGraph
from repro.query import ir


class _AdjIndex:
    """Sorted-array adjacency for one (edge label, direction)."""

    def __init__(self, keys: np.ndarray, nbrs: np.ndarray, props: dict[str, np.ndarray]):
        order = np.argsort(keys, kind="stable")
        self.keys = keys[order]
        self.nbrs = nbrs[order]
        self.props = {k: v[order] for k, v in props.items()}

    def slice(self, vid: int) -> slice:
        lo = np.searchsorted(self.keys, vid, "left")
        hi = np.searchsorted(self.keys, vid, "right")
        return slice(int(lo), int(hi))

    def neighbors(self, vid: int) -> np.ndarray:
        return self.nbrs[self.slice(vid)]


class HiActorEngine:
    """In-memory interpreter for physical GraphIR plans."""

    def __init__(self, pg: PropertyGraph):
        self.signatures = dict(pg.edge_signatures)
        self.vprops: dict[str, pd.DataFrame] = {
            l: p.set_index("id", drop=False) for l, p in pg.vertices.items()
        }
        self.adj: dict[tuple[str, str], _AdjIndex] = {}
        for label, pdf in pg.edges.items():
            props = {
                c: pdf[c].to_numpy() for c in pdf.columns if c not in ("src", "dst")
            }
            s, d = pdf.src.to_numpy(), pdf.dst.to_numpy()
            self.adj[(label, "out")] = _AdjIndex(s, d, props)
            self.adj[(label, "in")] = _AdjIndex(d, s, props)

    # -- plan interpretation -------------------------------------------
    def execute(self, plan) -> pd.DataFrame:
        df: pd.DataFrame | None = None
        for op in plan:
            df = self._apply(df, op)
        return df.reset_index(drop=True)

    def _vertex_frame(self, label: str, alias: str, predicate) -> pd.DataFrame:
        vp = self.vprops[label]
        # INDEX trait fast path: id-equality predicates become lookups
        ids = None
        rest = []
        for a in predicate or ():
            if isinstance(a, ir.Cmp) and a.prop in (None, "id") and a.op == "=":
                ids = [a.value] if a.value in vp.index else []
            elif isinstance(a, ir.InList) and a.prop in (None, "id"):
                ids = [v for v in a.values if v in vp.index]
            else:
                rest.append(a)
        sub = vp.loc[ids] if ids is not None else vp
        out = sub.rename(columns={c: f"{alias}_{c}" for c in sub.columns}).reset_index(
            drop=True
        )
        for a in rest:
            out = out[_eval_atom(out, a)]
        return out

    def _apply(self, df, op) -> pd.DataFrame:
        if isinstance(op, ir.Scan):
            rel = self._vertex_frame(op.label, op.alias, op.predicate)
            if df is None:
                return rel
            return df.merge(rel, how="cross")
        if isinstance(op, ir.ExpandEdge) or isinstance(op, ir.ExpandVertex):
            fused = isinstance(op, ir.ExpandVertex)
            ealias = op.alias if fused else op.edge_alias
            dirs = ["out", "in"] if op.direction == "both" else [op.direction]
            parts = []
            for d in dirs:
                idx = self.adj[(op.edge_label, d)]
                src_ids = df[f"{op.from_alias}_id"].to_numpy()
                lows = np.searchsorted(idx.keys, src_ids, "left")
                highs = np.searchsorted(idx.keys, src_ids, "right")
                counts = highs - lows
                row_rep = np.repeat(np.arange(len(df)), counts)
                take = np.concatenate(
                    [np.arange(l, h) for l, h in zip(lows, highs)]
                ) if len(df) else np.empty(0, dtype=np.int64)
                part = df.iloc[row_rep].reset_index(drop=True)
                if fused:
                    part[f"{op.alias}_id"] = idx.nbrs[take]
                    for c, arr in idx.props.items():
                        part[f"__fprop_{c}"] = arr[take]  # for edge predicate
                else:
                    part[f"{ealias}_nbr"] = idx.nbrs[take]
                    for c, arr in idx.props.items():
                        part[f"{ealias}_{c}"] = arr[take]
                parts.append(part)
            out = pd.concat(parts, ignore_index=True) if len(parts) > 1 else parts[0]
            for a in op.predicate or ():
                if fused:
                    tmp = out.rename(
                        columns={f"__fprop_{c}": f"{op.alias}_{c}" for c in idx.props}
                    )
                    out = out[_eval_atom(tmp, a)]
                else:
                    out = out[_eval_atom(out, a)]
            if fused:
                out = out.drop(columns=[c for c in out.columns if c.startswith("__fprop_")])
            return out
        if isinstance(op, ir.GetVertex):
            rel = self._vertex_frame(op.label, op.alias, op.predicate)
            out = df.merge(
                rel, left_on=f"{op.edge_alias}_nbr", right_on=f"{op.alias}_id"
            )
            return out.drop(columns=[f"{op.edge_alias}_nbr"])
        if isinstance(op, ir.Join):
            left = self.execute(op.left)
            right = self.execute(op.right)
            keys = sorted(set(left.columns) & set(right.columns))
            return left.merge(right, on=keys)
        if isinstance(op, ir.Select):
            for a in op.predicate:
                df = df[_eval_atom(df, a)]
            return df
        if isinstance(op, ir.Project):
            out = pd.DataFrame({e.name: df[e.ref.column] for e in op.exprs})
            return out.drop_duplicates() if op.distinct else out
        if isinstance(op, ir.GroupBy):
            return _groupby(df, op)
        if isinstance(op, ir.OrderBy):
            names = [n for n, _ in op.keys]
            asc = [a for _, a in op.keys]
            return df.sort_values(names, ascending=asc, kind="stable")
        if isinstance(op, ir.Limit):
            return df.head(op.n)
        if isinstance(op, ir.Count):
            return pd.DataFrame({op.name: [len(df)]})
        raise TypeError(f"unexecutable op {op!r}")


def _eval_atom(df: pd.DataFrame, a) -> pd.Series:
    if isinstance(a, ir.Cmp):
        col = df[f"{a.alias}_{a.prop if a.prop is not None else 'id'}"]
        return {
            "=": col == a.value,
            "!=": col != a.value,
            "<": col < a.value,
            "<=": col <= a.value,
            ">": col > a.value,
            ">=": col >= a.value,
        }[a.op]
    if isinstance(a, ir.InList):
        col = df[f"{a.alias}_{a.prop if a.prop is not None else 'id'}"]
        return col.isin(a.values)
    if isinstance(a, ir.ColEq):
        l, r = df[a.left.column], df[a.right.column]
        return {
            "=": l == r, "!=": l != r, "<": l < r,
            "<=": l <= r, ">": l > r, ">=": l >= r,
        }[a.op]
    if isinstance(a, ir.Raw):
        return df.eval(_sql_to_pandas(a.sql))
    raise TypeError(f"bad atom {a!r}")


def _sql_to_pandas(sql: str) -> str:
    """Best-effort SQL -> pandas.eval syntax for Raw atoms."""
    out = sql.replace("<>", "!=")
    # single '=' (not part of <=, >=, !=, ==) -> '=='
    import re as _re

    out = _re.sub(r"(?<![<>!=])=(?!=)", "==", out)
    out = _re.sub(r"\bAND\b", "and", out, flags=_re.IGNORECASE)
    out = _re.sub(r"\bOR\b", "or", out, flags=_re.IGNORECASE)
    return out


def _groupby(df: pd.DataFrame, op: ir.GroupBy) -> pd.DataFrame:
    fns = {"count": "count", "sum": "sum", "avg": "mean", "min": "min", "max": "max"}
    if not op.keys:  # global aggregation -> one row
        row = {}
        for a in op.aggs:
            if a.fn == "count" and a.ref is None:
                row[a.name] = len(df)
            else:
                row[a.name] = getattr(df[a.ref.column], fns[a.fn])()
        return pd.DataFrame([row])
    keys = [e.ref.column for e in op.keys]
    named = {e.name: e.ref.column for e in op.keys}
    g = df.groupby(keys, dropna=False, sort=False)
    cols = {}
    for a in op.aggs:
        if a.fn == "count" and a.ref is None:
            cols[a.name] = g.size()
        else:
            cols[a.name] = getattr(g[a.ref.column], fns[a.fn])()
    out = pd.DataFrame(cols).reset_index()
    ren = {src: name for name, src in named.items()}
    return out.rename(columns=ren)


# -- concurrency harness ----------------------------------------------------
def serve_threadpool(engine: HiActorEngine, tasks, n_workers: int) -> list:
    """Run callables(engine) on a shard-like worker pool; returns results."""
    with ThreadPoolExecutor(max_workers=n_workers) as ex:
        return list(ex.map(lambda t: t(engine), tasks))
