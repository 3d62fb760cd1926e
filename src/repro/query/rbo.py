"""Rule-based optimization: the two headline rules of §5.2.

* **FilterPushIntoMatch** — atoms from Select ops are moved into the
  operator that *binds* their alias (Scan / GetVertex for vertex
  aliases, ExpandEdge for edge aliases).  Only single-alias literal
  atoms are movable (``ir.pushable``); ColEq/Raw atoms stay put.
  Pushed predicates also reach the storage scan when the backend has
  the GRIN PREDICATE_PUSHDOWN trait (handled by the executors).
* **EdgeVertexFusion** — an (ExpandEdge, GetVertex) pair fuses into
  ExpandVertex when the plan never touches the vertex's properties or
  the edge's properties afterwards (the fused op yields only the
  neighbor id).  Mirrors the paper's condition that fusion is invalid
  when property retrieval is required in GET_VERTEX.

Both rules are pure plan->plan functions; semantic preservation is
asserted in tests by diffing optimized vs unoptimized results.
"""
from __future__ import annotations

from repro.query import ir


def _binder_index(plan, alias: str) -> int | None:
    """Index of the op that binds ``alias`` in a linear plan segment."""
    for i, op in enumerate(plan):
        if isinstance(op, ir.Scan) and op.alias == alias:
            return i
        if isinstance(op, ir.GetVertex) and op.alias == alias:
            return i
        if isinstance(op, ir.ExpandVertex) and op.alias == alias:
            return i
        if isinstance(op, ir.ExpandEdge) and op.edge_alias == alias:
            return i
    return None


def push_filters(plan) -> tuple:
    """FilterPushIntoMatch over a (possibly Join-nested) plan."""
    plan = list(plan)
    # recurse into Join branches first
    for i, op in enumerate(plan):
        if isinstance(op, ir.Join):
            plan[i] = ir.Join(push_filters(op.left), push_filters(op.right), op.on)

    changed = True
    while changed:
        changed = False
        for i, op in enumerate(plan):
            if not isinstance(op, ir.Select):
                continue
            keep: list = []
            for atom in op.predicate:
                moved = False
                if ir.pushable(atom):
                    j = _binder_index(plan[:i], atom.alias)
                    if j is not None:
                        tgt = plan[j]
                        if atom not in tgt.predicate:  # AND-idempotent dedup
                            plan[j] = ir.replace(
                                tgt, predicate=tuple(tgt.predicate) + (atom,)
                            )
                        moved = True
                    else:
                        # alias bound inside a Join branch
                        for j, jop in enumerate(plan[:i]):
                            if isinstance(jop, ir.Join):
                                for side in ("left", "right"):
                                    sub = getattr(jop, side)
                                    k = _binder_index(sub, atom.alias)
                                    if k is not None:
                                        sub = list(sub)
                                        sub[k] = ir.replace(
                                            sub[k],
                                            predicate=tuple(sub[k].predicate) + (atom,),
                                        )
                                        jop = ir.replace(jop, **{side: tuple(sub)})
                                        plan[j] = jop
                                        moved = True
                                        break
                                if moved:
                                    break
                if not moved:
                    keep.append(atom)
            if len(keep) != len(op.predicate):
                changed = True
                if keep:
                    plan[i] = ir.Select(tuple(keep))
                else:
                    plan.pop(i)
                break
    return tuple(plan)


def _strip_edge_preds(plan) -> tuple:
    """Drop ExpandEdge-inline predicates for the fusion legality check:
    the fused ExpandVertex still evaluates them pre-projection, so they
    must not count as downstream property uses."""
    out = []
    for op in plan:
        if isinstance(op, ir.ExpandEdge):
            out.append(ir.replace(op, predicate=()))
        elif isinstance(op, ir.Join):
            out.append(
                ir.Join(_strip_edge_preds(op.left), _strip_edge_preds(op.right), op.on)
            )
        else:
            out.append(op)
    return tuple(out)


def fuse_edge_vertex(plan) -> tuple:
    """EdgeVertexFusion over a (possibly Join-nested) plan."""
    refs = ir.referenced_props(_strip_edge_preds(plan))

    def fuse_linear(seg: tuple) -> tuple:
        out: list = []
        i = 0
        seg = list(seg)
        while i < len(seg):
            op = seg[i]
            nxt = seg[i + 1] if i + 1 < len(seg) else None
            if (
                isinstance(op, ir.ExpandEdge)
                and isinstance(nxt, ir.GetVertex)
                and nxt.edge_alias == op.edge_alias
                and not nxt.predicate  # property retrieval blocks fusion
                and not refs.get(nxt.alias)  # vertex props used later
                and not refs.get(op.edge_alias)  # edge props used later
            ):
                out.append(
                    ir.ExpandVertex(
                        op.edge_label, op.direction, op.from_alias, nxt.alias, op.predicate
                    )
                )
                i += 2
                continue
            if isinstance(op, ir.Join):
                op = ir.Join(fuse_linear(op.left), fuse_linear(op.right), op.on)
            out.append(op)
            i += 1
        return tuple(out)

    return fuse_linear(tuple(plan))


def apply_rbo(plan) -> tuple:
    """FilterPushIntoMatch, then EdgeVertexFusion (push first: a pushed
    vertex predicate legitimately blocks fusion of its binder)."""
    return fuse_edge_vertex(push_filters(plan))
