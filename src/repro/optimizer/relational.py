"""Standard relational optimizations on the Raven IR.

These are deliberately classical — the paper leans on them ("standard
DB optimizations such as predicate/projection pushdown and join
elimination can be triggered") and the interesting part is that *model*
rewrites enable them: after model-projection pushdown removes every
feature a joined table supplied, ``PruneColumns`` drops the join.

Note Catalyst will also push filters/projections once the plan is
codegen'd; doing it at the IR level matters because (a) join
elimination changes which tables are read at all, and (b) model rules
read filters gathered below predict operators.
"""
from __future__ import annotations

from repro.ir import (
    And,
    Col,
    Filter,
    Join,
    PlanNode,
    Project,
    Scan,
    UDFNode,
    Union,
    and_all,
    conjuncts,
)
from repro.ir.ops import ClusteredPredict, MLPredict, NNPredict
from repro.ir.plan import Catalog, output_columns
from repro.optimizer.rules import Rule

_PREDICTS = (MLPredict, NNPredict, ClusteredPredict)


def _push_filter_once(f: Filter, catalog: Catalog) -> tuple[PlanNode, bool]:
    """Push one Filter one step down, if legal."""
    child = f.child
    if isinstance(child, Filter):  # merge adjacent filters
        return Filter(child.child, and_all(conjuncts(f.predicate) + conjuncts(child.predicate))), True
    if isinstance(child, Project):
        # swap when every referenced column is a passthrough projection
        passthrough = {
            n for n, e in child.exprs if isinstance(e, Col) and e.name == n
        }
        if f.predicate.columns() <= passthrough:
            return Project(Filter(child.child, f.predicate), child.exprs), True
        return f, False
    if isinstance(child, Join):
        left_cols = set(output_columns(child.left, catalog))
        right_cols = set(output_columns(child.right, catalog))
        left_terms, right_terms, keep = [], [], []
        for t in conjuncts(f.predicate):
            cols = t.columns()
            if cols <= left_cols:
                left_terms.append(t)
            elif cols <= right_cols:
                right_terms.append(t)
            else:
                keep.append(t)
        if not left_terms and not right_terms:
            return f, False
        new_left = Filter(child.left, and_all(left_terms)) if left_terms else child.left
        new_right = Filter(child.right, and_all(right_terms)) if right_terms else child.right
        new_join = Join(new_left, new_right, child.left_on, child.right_on,
                        how=child.how, fk_one_to_one=child.fk_one_to_one)
        if keep:
            return Filter(new_join, and_all(keep)), True
        return new_join, True
    if isinstance(child, _PREDICTS):
        # a predicate that does not touch the prediction output commutes
        # with the predict operator
        if child.output_col not in f.predicate.columns():
            pushed = child.with_children([Filter(child.child, f.predicate)])
            return pushed, True
        return f, False
    if isinstance(child, Union):
        return Union([Filter(c, f.predicate) for c in child.children]), True
    return f, False


class FilterPushdown(Rule):
    """Push filters as far down as possible; merge adjacent filters."""

    name = "filter_pushdown"

    def apply(self, plan: PlanNode, catalog: Catalog) -> tuple[PlanNode, bool]:
        changed_any = False

        def rewrite(node: PlanNode) -> PlanNode:
            nonlocal changed_any
            new_children = [rewrite(c) for c in node.children]
            if new_children != node.children:
                node = node.with_children(new_children)
            if isinstance(node, Filter):
                node2, changed = _push_filter_once(node, catalog)
                if changed:
                    changed_any = True
                    # the push may expose further pushes below: recurse
                    return rewrite(node2)
            return node

        return rewrite(plan), changed_any


class PruneColumns(Rule):
    """Top-down required-column analysis: trims projections, inserts
    pruned Projects over Scans, and eliminates 1:1 joins whose right
    side contributes nothing but its key."""

    name = "prune_columns"

    def apply(self, plan: PlanNode, catalog: Catalog) -> tuple[PlanNode, bool]:
        changed = False

        def rewrite(node: PlanNode, required: set[str] | None) -> PlanNode:
            nonlocal changed
            if isinstance(node, Project):
                if required is None:
                    kept = node.exprs
                else:
                    kept = [(n, e) for n, e in node.exprs if n in required]
                    if not kept:  # keep at least one column for schema sanity
                        kept = node.exprs[:1]
                child_req = set()
                for _, e in kept:
                    child_req |= e.columns()
                new_child = rewrite(node.child, child_req)
                if len(kept) != len(node.exprs):
                    changed = True
                return Project(new_child, kept)
            if isinstance(node, Filter):
                child_req = None if required is None else required | node.predicate.columns()
                return Filter(rewrite(node.child, child_req), node.predicate)
            if isinstance(node, _PREDICTS):
                ins = set(node.input_cols)
                child_req = (
                    None
                    if required is None
                    else (required - {node.output_col}) | ins
                )
                return node.with_children([rewrite(node.child, child_req)])
            if isinstance(node, UDFNode):
                # unknown column use: everything below stays required
                return node.with_children([rewrite(node.child, None)])
            if isinstance(node, Union):
                return Union([rewrite(c, required) for c in node.children])
            if isinstance(node, Join):
                left_cols = set(output_columns(node.left, catalog))
                right_cols = set(output_columns(node.right, catalog))
                if required is not None:
                    right_used = (required & right_cols) - {node.right_on, node.left_on}
                    if node.fk_one_to_one and not right_used:
                        changed = True
                        return rewrite(node.left, required)
                    lr = (required & left_cols) | {node.left_on}
                    rr = (required & right_cols) | {node.right_on}
                else:
                    lr = rr = None
                return Join(
                    rewrite(node.left, lr),
                    rewrite(node.right, rr),
                    node.left_on,
                    node.right_on,
                    how=node.how,
                    fk_one_to_one=node.fk_one_to_one,
                )
            if isinstance(node, Scan):
                schema = catalog.schemas[node.table]
                if required is not None and set(schema) - required:
                    cols = [c for c in schema if c in required]
                    if not cols:
                        cols = schema[:1]
                    changed = True
                    return Project(Scan(node.table), [(c, Col(c)) for c in cols])
                return node
            return node.with_children([rewrite(c, None) for c in node.children])

        # the root's own output is fully required (required=None); pruning
        # starts propagating at the topmost Project/Predict node.
        new_plan = rewrite(plan, None)
        return new_plan, changed


def gather_constraints(node: PlanNode) -> dict:
    """Collect per-column constraints implied for every row *entering*
    ``node``'s parent — i.e. from all filters in ``node``'s subtree,
    stopping at renaming projections. Used by predicate-based pruning."""
    from repro.ir import Constraint, column_constraints

    def merge(a: dict, b: dict) -> dict:
        out = dict(a)
        for col, c in b.items():
            if col not in out:
                out[col] = c
                continue
            m: Constraint = out[col]
            merged = Constraint(
                lo=max(m.lo, c.lo),
                lo_strict=m.lo_strict if m.lo >= c.lo else c.lo_strict,
                hi=min(m.hi, c.hi),
                hi_strict=m.hi_strict if m.hi <= c.hi else c.hi_strict,
                eq=m.eq if m.eq is not None else c.eq,
            )
            out[col] = merged
        return out

    if isinstance(node, Filter):
        return merge(gather_constraints(node.child), column_constraints(node.predicate))
    if isinstance(node, Project):
        inner = gather_constraints(node.child)
        out = {}
        for n, e in node.exprs:
            if isinstance(e, Col) and e.name in inner:
                out[n] = inner[e.name]
        return out
    if isinstance(node, Join):
        return merge(gather_constraints(node.left), gather_constraints(node.right))
    if isinstance(node, _PREDICTS):
        return gather_constraints(node.child)
    if isinstance(node, UDFNode):
        return {}  # UDF may rewrite anything: no guarantees survive
    if isinstance(node, Union):
        return {}  # would need per-branch intersection; stay sound
    return {}
