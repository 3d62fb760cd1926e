"""Cost-based pattern-match lowering (GLogue-style, paper §5.2).

Given a pattern graph, the CBO chooses (1) the *start* vertex and
(2) the edge expansion *order* by minimizing the sum of estimated
intermediate cardinalities — the same objective GLogue uses (sum of
subgraph frequencies along the plan).  Cardinalities come from the
:class:`repro.query.catalog.Catalog` (1-vertex and 1-edge frequency
tiers + predicate selectivities).

The output is always a *linear chain* over the connected pattern:
a selective Scan, then ExpandEdge/GetVertex per pattern edge (cycle
edges close with a ColEq), with vertex/edge predicates placed at their
binding sites.  This realizes both CBO behaviours shown in Fig. 5:
starting from the selective 'a' vertex, and merging the shared 'b'
vertex so it is never scanned separately.
"""
from __future__ import annotations

import itertools

from repro.query import ir
from repro.query.catalog import Catalog

MAX_EXHAUSTIVE_EDGES = 6


def _collect_pushable(match: ir.Match, extra_selects) -> dict[str, tuple]:
    """alias -> pushable atoms from inline predicates + later Selects."""
    atoms: dict[str, list] = {}
    for a, _l, p in match.vertices:
        for atom in p or ():
            if ir.pushable(atom):
                atoms.setdefault(a, []).append(atom)
    for sel in extra_selects or ():
        for atom in sel.predicate:
            if ir.pushable(atom):
                atoms.setdefault(atom.alias, []).append(atom)
    return {k: tuple(v) for k, v in atoms.items()}


def _plan_cost(order, start, labels, preds, catalog: Catalog) -> float:
    """Sum of estimated intermediate cardinalities along one order."""
    card = catalog.vertex_card(labels[start], preds.get(start, ()))
    cost = card
    bound = {start}
    for pe in order:
        factor = (
            catalog.expand_factor(pe.label, pe.direction)
            if pe.src in bound
            else catalog.expand_factor(
                pe.label, {"out": "in", "in": "out", "both": "both"}[pe.direction]
            )
        )
        card *= factor
        new = {pe.src, pe.dst} - bound
        if not new:  # cycle closure: strong filter
            card *= 0.1
        else:
            a = next(iter(new))
            card *= catalog.selectivity(preds.get(a, ()))
        bound |= {pe.src, pe.dst}
        cost += card
    return cost


def _valid_orders(edges, start):
    """Edge orders where each edge touches an already-bound alias."""
    n = len(edges)
    if n <= MAX_EXHAUSTIVE_EDGES:
        for perm in itertools.permutations(edges):
            bound = {start}
            ok = True
            for pe in perm:
                if pe.src not in bound and pe.dst not in bound:
                    ok = False
                    break
                bound |= {pe.src, pe.dst}
            if ok:
                yield list(perm)
        return
    # greedy single order for large patterns
    remaining = list(edges)
    bound = {start}
    order = []
    while remaining:
        pick = next(
            (pe for pe in remaining if pe.src in bound or pe.dst in bound), None
        )
        if pick is None:
            break
        order.append(pick)
        bound |= {pick.src, pick.dst}
        remaining.remove(pick)
    yield order


def lower_match_cbo(match: ir.Match, catalog: Catalog, *, extra_selects=()) -> tuple:
    labels = {a: l for a, l, _ in match.vertices}
    preds = _collect_pushable(match, extra_selects)
    pushed: set = set()  # atoms placed inline (planner leaves the
    # trailing Select in place; dedup is semantic-free since AND is
    # idempotent, so we do not remove them from the Select)

    best = None
    for start in labels:
        for order in _valid_orders(match.edges, start):
            if len(order) < len(match.edges):
                continue  # disconnected under this start
            c = _plan_cost(order, start, labels, preds, catalog)
            if best is None or c < best[0]:
                best = (c, start, order)
    if best is None:
        raise ValueError("pattern not connected from any start vertex")
    _, start, order = best

    ops: list = [ir.Scan(labels[start], start, preds.get(start, ()))]
    bound = {start}
    for i, pe in enumerate(order):
        ealias = pe.edge_alias or f"__c{i}"
        forward = pe.src in bound
        direction = (
            pe.direction
            if forward
            else {"out": "in", "in": "out", "both": "both"}[pe.direction]
        )
        frm = pe.src if forward else pe.dst
        to = pe.dst if forward else pe.src
        ops.append(ir.ExpandEdge(pe.label, direction, frm, ealias, pe.predicate))
        if to in bound:  # cycle closure
            ops.append(
                ir.Select((ir.ColEq(ir.Ref(ealias, "nbr"), ir.Ref(to, None)),))
            )
        else:
            ops.append(ir.GetVertex(ealias, to, labels[to], preds.get(to, ())))
            bound.add(to)
    return tuple(ops)
