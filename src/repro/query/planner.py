"""Logical->physical compilation pipeline for the interactive stack.

``compile_plan`` is the single entry both engines use:

1. **Lowering** — every :class:`ir.Match` node becomes a chain of
   Scan/ExpandEdge/GetVertex ops.  Without CBO, edges are lowered in
   *declaration order*, starting a new branch whenever an edge touches
   no bound alias — reproducing the bifurcated logical DAG of
   Fig. 5(c) (two MATCH clauses sharing 'b' -> scan + scan + join).
   With CBO, :func:`repro.query.cbo.lower_match_cbo` picks the start
   vertex and expansion order by estimated cost (GLogue-lite), always
   producing a linear chain.
2. **RBO** — :func:`repro.query.rbo.apply_rbo` runs
   FilterPushIntoMatch then EdgeVertexFusion.

All predicates start as a trailing Select (the user-visible WHERE /
inline-property semantics); optimization only *moves* them, so
optimized and unoptimized plans are row-equivalent (asserted in tests).
"""
from __future__ import annotations

from repro.query import ir


def lower_match_naive(match: ir.Match, *, alias_prefix: str = "") -> tuple:
    """Declaration-order lowering; may produce Join of branches.

    ``alias_prefix`` keeps auto-generated edge aliases globally unique
    when several Match clauses are lowered separately and joined —
    a collision would make the Join key on edge properties.
    """
    labels = {a: l for a, l, _ in match.vertices}
    vpreds = {a: tuple(p) for a, l, p in match.vertices if p}
    branches: list[tuple[list, set]] = []  # (ops, bound aliases)
    eidx = 0

    def scan(alias) -> tuple[list, set]:
        return ([ir.Scan(labels[alias], alias)], {alias})

    for pe in match.edges:
        eidx += 1
        ealias = pe.edge_alias or f"__{alias_prefix}e{eidx}"
        target = None
        for ops, bound in branches:
            if pe.src in bound or pe.dst in bound:
                target = (ops, bound)
                break
        if target is None:
            target = scan(pe.src)
            branches.append(target)
        ops, bound = target
        if pe.src in bound and pe.dst in bound:
            # cycle-closing edge: expand and equate far endpoint
            ops.append(ir.ExpandEdge(pe.label, pe.direction, pe.src, ealias, pe.predicate))
            ops.append(ir.Select((ir.ColEq(ir.Ref(ealias, "nbr"), ir.Ref(pe.dst, None)),)))
        elif pe.src in bound:
            ops.append(ir.ExpandEdge(pe.label, pe.direction, pe.src, ealias, pe.predicate))
            ops.append(ir.GetVertex(ealias, pe.dst, labels[pe.dst]))
            bound.add(pe.dst)
        else:  # pe.dst bound: traverse the edge in reverse
            rev = {"out": "in", "in": "out", "both": "both"}[pe.direction]
            ops.append(ir.ExpandEdge(pe.label, rev, pe.dst, ealias, pe.predicate))
            ops.append(ir.GetVertex(ealias, pe.src, labels[pe.src]))
            bound.add(pe.src)
    # isolated pattern vertices (no edges touch them)
    touched = set()
    for pe in match.edges:
        touched.update((pe.src, pe.dst))
    for a in labels:
        if a not in touched:
            branches.append(scan(a))
    # merge branches with joins on shared aliases (bifurcated DAG)
    ops, bound = branches[0]
    plan = tuple(ops)
    for bops, bbound in branches[1:]:
        shared = tuple(sorted(bound & bbound))
        plan = (ir.Join(plan, tuple(bops), shared),)
        bound |= bbound
    # inline vertex predicates surface as a trailing Select (WHERE-like);
    # RBO/CBO may push them back down
    atoms: list = []
    for a, p in vpreds.items():
        atoms.extend(p)
    if atoms:
        plan = plan + (ir.Select(tuple(atoms)),)
    return plan


def compile_plan(
    plan,
    *,
    catalog=None,
    rbo: bool = True,
    cbo: bool = False,
) -> tuple:
    """Lower Match nodes and optionally optimize. Returns a physical plan."""
    from repro.query.cbo import lower_match_cbo
    from repro.query.rbo import apply_rbo

    matches = [op for op in plan if isinstance(op, ir.Match)]
    rest = [op for op in plan if not isinstance(op, ir.Match)]

    lowered: list = []
    if matches:
        if cbo:
            if catalog is None:
                raise ValueError("CBO requires a Catalog")
            merged = merge_matches(matches)
            later = tuple(o for o in rest if isinstance(o, ir.Select))
            lowered.extend(lower_match_cbo(merged, catalog, extra_selects=later))
        else:
            # lower each MATCH clause separately; join consecutive
            # clauses on their shared aliases (the bifurcated DAG)
            cur = lower_match_naive(matches[0], alias_prefix="m0")
            bound = _aliases_of(matches[0])
            for mi, mt in enumerate(matches[1:], start=1):
                nxt = lower_match_naive(mt, alias_prefix=f"m{mi}")
                nbound = _aliases_of(mt)
                shared = tuple(sorted(bound & nbound))
                cur = (ir.Join(cur, nxt, shared),)
                bound |= nbound
            lowered.extend(cur)
    lowered.extend(rest)
    physical = tuple(lowered)
    if rbo:
        physical = apply_rbo(physical)
    return physical


def _aliases_of(match: ir.Match) -> set:
    return {a for a, _, _ in match.vertices}


def merge_matches(matches) -> ir.Match:
    """Union several Match clauses into one pattern graph (CBO input)."""
    labels: dict[str, str] = {}
    preds: dict[str, list] = {}
    edges: list = []
    for mt in matches:
        for a, l, p in mt.vertices:
            labels.setdefault(a, l)
            preds.setdefault(a, []).extend(p)
        edges.extend(mt.edges)
    vertices = tuple((a, labels[a], tuple(preds[a])) for a in labels)
    return ir.Match(vertices, tuple(edges))
