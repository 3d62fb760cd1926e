"""Mini-Cypher front-end -> GraphIR (paper §5.1, right of Fig. 5).

Supported subset (sufficient for the paper's example queries, the
fraud-detection query of Fig. 6(a), and the BI workloads):

```
MATCH (a:Person {name: 'A1'})-[e:KNOWS]->(b:Person)-[:BUY]->(c:Item),
      (b)<-[:LIKES]-(d:Person)
WHERE c.price > 10 AND d.id IN [1, 2] AND e.date - e2.date < 5
RETURN a.name AS who, count(c) AS cnt
ORDER BY cnt DESC LIMIT 10
```

Multiple MATCH clauses merge into one pattern graph (shared aliases
connect them) — this is what produces the bifurcated naive plan and
gives the CBO its Fig. 5 "merge the shared vertex" opportunity.
Aggregates in RETURN follow Cypher's implicit-grouping rule (non-agg
items become grouping keys).
"""
from __future__ import annotations

import re

from repro.query import ir

_NODE = re.compile(
    r"\((?P<alias>[a-zA-Z_]\w*)?(?::(?P<label>\w+))?(?:\s*\{(?P<props>[^}]*)\})?\)"
)
_REL = re.compile(
    r"(?P<larrow><)?-\[\s*(?P<alias>[a-zA-Z_]\w*)?(?::(?P<label>\w+))?\s*\]-(?P<rarrow>>)?"
)


def _lit(tok: str):
    tok = tok.strip()
    if tok.startswith(("'", '"')):
        return tok[1:-1]
    if tok.lower() in ("true", "false"):
        return tok.lower() == "true"
    if re.fullmatch(r"-?\d+", tok):
        return int(tok)
    if re.fullmatch(r"-?\d*\.\d+", tok):
        return float(tok)
    raise ValueError(f"unsupported literal {tok!r}")


class _PatternState:
    def __init__(self):
        self.vertices: dict[str, tuple[str | None, list]] = {}  # alias -> (label, atoms)
        self.edges: list[ir.PatternEdge] = []
        self.n_anon = 0

    def fresh(self, kind: str) -> str:
        self.n_anon += 1
        return f"_{kind}{self.n_anon}"

    def node(self, alias, label, props) -> str:
        alias = alias or self.fresh("v")
        old_label, atoms = self.vertices.get(alias, (None, []))
        label = label or old_label
        if props:
            for kv in props.split(","):
                k, v = kv.split(":", 1)
                atoms.append(ir.Cmp(alias, k.strip(), "=", _lit(v)))
        self.vertices[alias] = (label, atoms)
        return alias


def _parse_pattern_path(path: str, st: _PatternState) -> None:
    pos = 0
    m = _NODE.match(path, pos)
    if not m:
        raise ValueError(f"bad pattern {path!r}")
    cur = st.node(m.group("alias"), m.group("label"), m.group("props"))
    pos = m.end()
    while pos < len(path):
        r = _REL.match(path, pos)
        if not r:
            raise ValueError(f"bad relationship at {path[pos:]!r}")
        pos = r.end()
        n = _NODE.match(path, pos)
        if not n:
            raise ValueError(f"relationship without target node in {path!r}")
        nxt = st.node(n.group("alias"), n.group("label"), n.group("props"))
        pos = n.end()
        elabel = r.group("label")
        ealias = r.group("alias")
        if elabel is None:
            raise ValueError("edge label required in this subset")
        if r.group("rarrow"):  # (cur)-[..]->(nxt)
            st.edges.append(ir.PatternEdge(cur, nxt, elabel, "out", ealias))
        elif r.group("larrow"):  # (cur)<-[..]-(nxt)
            st.edges.append(ir.PatternEdge(nxt, cur, elabel, "out", ealias))
        else:  # undirected
            st.edges.append(ir.PatternEdge(cur, nxt, elabel, "both", ealias))
        cur = nxt


def _split_top_commas(s: str) -> list[str]:
    out, depth, start = [], 0, 0
    for i, ch in enumerate(s):
        if ch in "([{":
            depth += 1
        elif ch in ")]}":
            depth -= 1
        elif ch == "," and depth == 0:
            out.append(s[start:i])
            start = i + 1
    out.append(s[start:])
    return [p.strip() for p in out if p.strip()]


_ATOM_CMP = re.compile(
    r"^(\w+)\.(\w+)\s*(=|!=|<>|<=|>=|<|>)\s*(.+)$"
)
_ATOM_ID_CMP = re.compile(r"^(\w+)\.id\s*(=|!=|<>|<=|>=|<|>)\s*(.+)$")
_ATOM_IN = re.compile(r"^(\w+)\.(\w+)\s+IN\s+\[(.*)\]$", re.IGNORECASE)


def _parse_where_atom(s: str):
    s = s.strip()
    m = _ATOM_IN.match(s)
    if m:
        alias, prop, vals = m.groups()
        values = tuple(_lit(v) for v in vals.split(",") if v.strip())
        prop_ = None if prop == "id" else prop
        return ir.InList(alias, prop_, values)
    m = _ATOM_CMP.match(s)
    if m:
        alias, prop, op, rhs = m.groups()
        op = "!=" if op == "<>" else op
        prop_ = None if prop == "id" else prop
        cm = re.fullmatch(r"([A-Za-z_]\w*)\.([A-Za-z_]\w*)", rhs.strip())
        if cm:  # rhs is alias.prop -> column comparison
            return ir.ColEq(
                ir.Ref(alias, prop_),
                ir.Ref(cm.group(1), None if cm.group(2) == "id" else cm.group(2)),
                op,
            )
        try:
            return ir.Cmp(alias, prop_, op, _lit(rhs))
        except ValueError:
            pass  # complex rhs -> raw fallback below
    # fallback: raw prefixed SQL (rewrite alias.prop -> alias_prop;
    # identifier-dot-identifier only, so 0.9-style literals survive)
    ident_dot = r"\b([A-Za-z_]\w*)\.([A-Za-z_]\w*)\b"
    aliases = tuple({a for a, _ in re.findall(ident_dot, s)})
    sql = re.sub(ident_dot, r"\1_\2", s)
    return ir.Raw(sql, aliases)


_AGG = re.compile(r"^(count|sum|avg|min|max)\s*\(\s*(distinct\s+)?(.*?)\s*\)$", re.IGNORECASE)


def _parse_return_item(item: str, idx: int):
    """-> ('agg', AggExpr) | ('key', ProjExpr)"""
    item = item.strip()
    name = None
    m = re.search(r"\s+AS\s+(\w+)$", item, re.IGNORECASE)
    if m:
        name = m.group(1)
        item = item[: m.start()].strip()
    a = _AGG.match(item)
    if a:
        fn = a.group(1).lower()
        inner = a.group(3).strip()
        if inner == "*" or (fn == "count" and not inner):
            return "agg", ir.AggExpr("count", None, name or "cnt")
        rm = re.fullmatch(r"(\w+)(?:\.(\w+))?", inner)
        if not rm:
            raise ValueError(f"unsupported aggregate arg {inner!r}")
        ref = ir.Ref(rm.group(1), rm.group(2))
        if fn == "count":  # count(alias[.prop]) ~ count rows with non-null
            return "agg", ir.AggExpr("count", ref, name or f"cnt{idx}")
        return "agg", ir.AggExpr(fn, ref, name or f"{fn}{idx}")
    rm = re.fullmatch(r"(\w+)(?:\.(\w+))?", item)
    if not rm:
        raise ValueError(f"unsupported RETURN item {item!r}")
    ref = ir.Ref(rm.group(1), rm.group(2))
    default = rm.group(1) if rm.group(2) is None else f"{rm.group(1)}_{rm.group(2)}"
    return "key", ir.ProjExpr(ref, name or default)


def parse_cypher(text: str) -> tuple:
    """Parse a MATCH/WHERE/RETURN[/ORDER BY/LIMIT] query into a plan."""
    text = re.sub(r"/\*.*?\*/", " ", text, flags=re.DOTALL)
    text = re.sub(r"\s+", " ", text).strip().rstrip(";")
    m = re.match(
        r"^(?P<body>.*?)\s+RETURN\s+(?P<distinct>DISTINCT\s+)?(?P<ret>.*?)"
        r"(?:\s+ORDER\s+BY\s+(?P<order>.*?))?(?:\s+LIMIT\s+(?P<limit>\d+))?$",
        text,
        re.IGNORECASE,
    )
    if not m:
        raise ValueError("query must contain RETURN")
    body, ret = m.group("body"), m.group("ret")

    # Each MATCH clause becomes its *own* Match node (labels are shared
    # across clauses).  The naive planner lowers the clauses separately
    # and joins them on shared aliases — the bifurcated logical DAG of
    # Fig. 5(c); the CBO merges them into one pattern first.
    where_atoms: list = []
    labels: dict[str, str | None] = {}
    clause_states: list[_PatternState] = []
    for clause in re.split(r"\bMATCH\b", body, flags=re.IGNORECASE):
        clause = clause.strip()
        if not clause:
            continue
        st = _PatternState()
        st.n_anon = sum(s.n_anon for s in clause_states)  # unique anon names
        wsplit = re.split(r"\bWHERE\b", clause, flags=re.IGNORECASE)
        pattern_part = wsplit[0].strip().rstrip(",")
        for path in _split_top_commas(pattern_part):
            _parse_pattern_path(path, st)
        if len(wsplit) > 1:
            for atom_s in re.split(r"\bAND\b", wsplit[1], flags=re.IGNORECASE):
                where_atoms.append(_parse_where_atom(atom_s))
        for a, (lbl, _) in st.vertices.items():
            if lbl is not None:
                labels.setdefault(a, lbl)
        clause_states.append(st)

    plan: list = []
    for st in clause_states:
        vertices = []
        for a, (lbl, atoms) in st.vertices.items():
            lbl = lbl or labels.get(a)
            if lbl is None:
                raise ValueError(f"alias {a!r} has no label anywhere in the query")
            vertices.append((a, lbl, tuple(atoms)))
        plan.append(ir.Match(tuple(vertices), tuple(st.edges)))
    if where_atoms:
        plan.append(ir.Select(tuple(where_atoms)))

    keys, aggs = [], []
    for i, item in enumerate(_split_top_commas(ret)):
        kind, expr = _parse_return_item(item, i)
        (aggs if kind == "agg" else keys).append(expr)
    if aggs:
        plan.append(ir.GroupBy(tuple(keys), tuple(aggs)))
    else:
        plan.append(ir.Project(tuple(keys), distinct=bool(m.group("distinct"))))
    if m.group("order"):
        order = []
        for part in _split_top_commas(m.group("order")):
            toks = part.split()
            asc = not (len(toks) > 1 and toks[1].upper() == "DESC")
            order.append((toks[0], asc))
        plan.append(ir.OrderBy(tuple(order)))
    if m.group("limit"):
        plan.append(ir.Limit(int(m.group("limit"))))
    return tuple(plan)
