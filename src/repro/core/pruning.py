"""§6.3 MCS pruning rules.

Both rules decide whether an *ancestor one-to-many operator* ``A`` of a
reconfiguration operator ``o_i`` can be dropped from the set M used to
build the MCS (Algorithm 4, ``pruneAncestors``):

1. **Edge-wise one-to-one rule** — prune ``A`` if (a) on each of its output
   edges ``A`` emits at most one tuple per input tuple
   (``Operator.edgewise_one_to_one``, e.g. Replicate / broadcast), and
   (b) exactly one of ``A``'s output edges can reach *any* operator of the
   reconfiguration, and ``o_i`` is reachable through that edge. Then only a
   single output tuple of ``A`` per transaction is affected, so no
   synchronization at ``A`` is needed (Fig. 9).
2. **Uniqueness rule** — prune ``A`` if on *every* path from ``A`` to
   ``o_i`` there is an operator with the per-transaction uniqueness
   property (``Operator.unique_per_txn``, e.g. a self-join on a key), which
   collapses the fan-out back to at most one tuple per transaction
   (Fig. 10).
"""
from __future__ import annotations

from .dag import DAG


def ancestor_one_to_many(dag: DAG, o_i: str) -> set[str]:
    """The set 𝒜 of strict ancestors of ``o_i`` that are one-to-many."""
    return {a for a in dag.ancestors(o_i) if dag.op(a).one_to_many}


def edges_reaching(dag: DAG, a: str, targets: set[str]) -> list[str]:
    """Children c of ``a`` such that some vertex of ``targets`` is reachable
    from c (including c itself). One entry per output edge of ``a``."""
    out = []
    for c in dag.out_edges(a):
        if c in targets or dag.descendants(c) & targets:
            out.append(c)
    return out


def can_prune_edgewise(dag: DAG, a: str, o_i: str, reconfig_ops: set[str]) -> bool:
    """Edge-wise one-to-one rule for ancestor ``a`` of ``o_i``."""
    if not dag.op(a).edgewise_one_to_one:
        return False
    reaching = edges_reaching(dag, a, set(reconfig_ops))
    if len(reaching) != 1:
        return False
    c = reaching[0]
    return c == o_i or o_i in dag.descendants(c)


def can_prune_uniqueness(dag: DAG, a: str, o_i: str) -> bool:
    """Uniqueness rule: every path a→o_i crosses a unique-per-txn operator.

    Equivalently: ``o_i`` is unreachable from ``a`` once the unique-per-txn
    vertices are removed from the graph (endpoints excluded).
    """
    if not dag.has_path(a, o_i) or a == o_i:
        return False
    blocked = {v for v in dag.vertices if dag.op(v).unique_per_txn and v not in (a, o_i)}
    stack = [c for c in dag.out_edges(a) if c not in blocked]
    seen: set[str] = set()
    while stack:
        v = stack.pop()
        if v == o_i:
            return False  # found a path avoiding every uniqueness operator
        if v in seen:
            continue
        seen.add(v)
        stack.extend(c for c in dag.out_edges(v) if c not in blocked)
    return True


def prune_ancestors(
    dag: DAG, ancestors: set[str], o_i: str, reconfig_ops: set[str]
) -> set[str]:
    """Algorithm 4's ``pruneAncestors``: the subset of ``ancestors`` that
    still must be synchronized for reconfiguration operator ``o_i``."""
    return {
        a
        for a in ancestors
        if not (
            can_prune_edgewise(dag, a, o_i, reconfig_ops)
            or can_prune_uniqueness(dag, a, o_i)
        )
    }


def earliest_ancestors(dag: DAG, ancestors: set[str]) -> set[str]:
    """``computeEarliestAncestors``: minimal elements of ``ancestors`` under
    the DAG's reachability partial order (no other member is their strict
    ancestor) — the most-upstream fan-out points."""
    return {
        a
        for a in ancestors
        if not any(b != a and dag.has_path(b, a) for b in ancestors)
    }
