"""Mini-Gremlin front-end -> GraphIR (paper §5.1, left of Fig. 5).

Two surfaces over the same lowering:

* a fluent builder — ``G(signatures).V("Person").has("name", "A1")
  .out("KNOWS").out("BUY").values("price")``;
* :func:`parse_gremlin` — a string parser for the Gremlin subset used
  in the paper's examples (``g.V().hasLabel(..).has(..).out(..)
  .in_(..).both(..).values(..).select(..).count().limit(..).dedup()``).

``signatures`` (edge label -> (src label, dst label)) resolves the
vertex label a traversal step lands on, the role the LPG schema plays
in the real compiler's catalog.
"""
from __future__ import annotations

import re

from repro.query import ir


class G:
    """Traversal builder accumulating IR operators."""

    def __init__(self, signatures: dict[str, tuple[str, str]]):
        self._sig = signatures
        self._ops: list = []
        self._n = 0
        self._alias: str | None = None  # current head binding
        self._label: str | None = None
        self._select_atoms: list = []
        self._tail: list = []  # Project/Count/OrderBy/Limit

    # -- steps ----------------------------------------------------------
    def V(self, label: str) -> "G":
        self._alias = self._fresh()
        self._label = label
        self._ops.append(ir.Scan(label, self._alias))
        return self

    def as_(self, name: str) -> "G":
        """Rename the current head binding (Gremlin ``as('x')``)."""
        old = self._alias
        self._ops = [_rename_ops(op, old, name) for op in self._ops]
        self._select_atoms = [_rename_atom(a, old, name) for a in self._select_atoms]
        self._alias = name
        return self

    def has(self, prop: str, *args) -> "G":
        op, value = ("=", args[0]) if len(args) == 1 else (args[0], args[1])
        self._select_atoms.append(ir.Cmp(self._alias, prop, op, value))
        return self

    def has_id(self, vid: int) -> "G":
        self._select_atoms.append(ir.Cmp(self._alias, None, "=", vid))
        return self

    def within(self, prop: str, values) -> "G":
        self._select_atoms.append(ir.InList(self._alias, prop, tuple(values)))
        return self

    def out(self, edge_label: str) -> "G":
        return self._expand(edge_label, "out")

    def in_(self, edge_label: str) -> "G":
        return self._expand(edge_label, "in")

    def both(self, edge_label: str) -> "G":
        return self._expand(edge_label, "both")

    def _expand(self, edge_label: str, direction: str) -> "G":
        sl, dl = self._sig[edge_label]
        target_label = dl if direction == "out" else sl if direction == "in" else sl
        ealias = self._fresh("e")
        valias = self._fresh()
        self._ops.append(ir.ExpandEdge(edge_label, direction, self._alias, ealias))
        self._ops.append(ir.GetVertex(ealias, valias, target_label))
        self._alias, self._label = valias, target_label
        return self

    # -- terminal / relational steps ------------------------------------
    def values(self, *props: str) -> "G":
        self._tail.append(
            ir.Project(tuple(ir.ProjExpr(ir.Ref(self._alias, p), p) for p in props))
        )
        return self

    def id_(self) -> "G":
        self._tail.append(
            ir.Project((ir.ProjExpr(ir.Ref(self._alias, None), "id"),))
        )
        return self

    def select(self, *aliases: str) -> "G":
        self._tail.append(
            ir.Project(tuple(ir.ProjExpr(ir.Ref(a, None), f"{a}_id") for a in aliases))
        )
        return self

    def dedup(self) -> "G":
        if self._tail and isinstance(self._tail[-1], ir.Project):
            self._tail[-1] = ir.replace(self._tail[-1], distinct=True)
        else:
            self._tail.append(
                ir.Project((ir.ProjExpr(ir.Ref(self._alias, None), "id"),), distinct=True)
            )
        return self

    def count(self) -> "G":
        self._tail.append(ir.Count())
        return self

    def order_by(self, name: str, asc: bool = True) -> "G":
        self._tail.append(ir.OrderBy(((name, asc),)))
        return self

    def limit(self, n: int) -> "G":
        self._tail.append(ir.Limit(n))
        return self

    # -- build ----------------------------------------------------------
    def plan(self) -> tuple:
        """Logical plan: traversal ops + one Select (WHERE analog) + tail."""
        mid = (ir.Select(tuple(self._select_atoms)),) if self._select_atoms else ()
        return tuple(self._ops) + mid + tuple(self._tail)

    def _fresh(self, kind: str = "v") -> str:
        self._n += 1
        return f"{kind}{self._n}"


def _rename_ops(op, old: str, new: str):
    """Rewrite alias ``old`` -> ``new`` inside one IR node."""
    if isinstance(op, ir.Scan) and op.alias == old:
        return ir.replace(op, alias=new)
    if isinstance(op, ir.GetVertex) and op.alias == old:
        return ir.replace(op, alias=new)
    if isinstance(op, ir.ExpandEdge) and op.from_alias == old:
        return ir.replace(op, from_alias=new)
    return op


def _rename_atom(a, old: str, new: str):
    if isinstance(a, (ir.Cmp, ir.InList)) and a.alias == old:
        return ir.replace(a, alias=new)
    return a


_STEP_RE = re.compile(r"\.(\w+)\(([^()]*)\)")


def _parse_args(raw: str) -> list:
    args = []
    for tok in filter(None, (t.strip() for t in raw.split(","))):
        if tok.startswith(("'", '"')):
            args.append(tok[1:-1])
        elif tok in ("true", "false"):
            args.append(tok == "true")
        elif re.fullmatch(r"-?\d+", tok):
            args.append(int(tok))
        elif re.fullmatch(r"-?\d*\.\d+", tok):
            args.append(float(tok))
        else:
            args.append(tok)
    return args


def parse_gremlin(text: str, signatures: dict[str, tuple[str, str]]) -> tuple:
    """Parse a ``g.V()...`` traversal string into a logical plan."""
    text = re.sub(r"\s+", "", text)
    if not text.startswith("g"):
        raise ValueError("traversal must start with 'g'")
    b = G(signatures)
    steps = _STEP_RE.findall(text[1:])
    if not steps or steps[0][0] != "V":
        raise ValueError("traversal must start with g.V(...)")
    for name, raw in steps:
        args = _parse_args(raw)
        if name == "V":
            if len(args) != 1:
                raise ValueError("g.V() requires a label in this subset")
            b.V(args[0])
        elif name == "hasLabel":
            pass  # label already fixed by V(label)
        elif name == "has":
            b.has(*args)
        elif name == "hasId":
            b.has_id(args[0])
        elif name == "within":
            b.within(args[0], args[1:])
        elif name == "out":
            b.out(args[0])
        elif name in ("in_", "in"):
            b.in_(args[0])
        elif name == "both":
            b.both(args[0])
        elif name == "values":
            b.values(*args)
        elif name == "id":
            b.id_()
        elif name == "as_":
            b.as_(args[0])
        elif name == "select":
            b.select(*args)
        elif name == "dedup":
            b.dedup()
        elif name == "count":
            b.count()
        elif name == "order_by":
            b.order_by(*args)
        elif name == "limit":
            b.limit(args[0])
        else:
            raise ValueError(f"unsupported Gremlin step .{name}()")
    return b.plan()
