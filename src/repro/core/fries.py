"""The Fries scheduler's planning side — Algorithms 2, 3 and 4 — plus the
epoch-based (EBR) plan used by the baseline.

Planning is pure graph computation: given the dataflow DAG and the set of
reconfiguration operators, produce a :class:`ReconfigPlan` describing where
FCMs are sent and along which edges epoch markers are propagated. The
runtime side (delivering FCMs, marker alignment, applying configurations)
lives in :mod:`repro.engine.schedulers`.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable

from .dag import DAG, SubDAG
from .mcs import components, find_mcs, head_operators
from .pruning import ancestor_one_to_many, earliest_ancestors, prune_ancestors


@dataclass(frozen=True)
class ReconfigPlan:
    """A scheduled reconfiguration.

    ``reconfig_ops``
        the operators whose function is updated (the set in 𝓡).
    ``m``
        the vertex set used to build the MCS (reconfig ops + any earliest
        one-to-many ancestors kept after pruning).
    ``mcs``
        the minimal covering sub-DAG.
    ``component_list``
        weakly-connected components of the MCS, each a synchronization unit.
    ``heads``
        per component, the operators receiving an FCM from the controller.
    ``marker_edges``
        the union of component-internal edges: the only edges on which
        epoch markers are propagated (empty for singleton components).
    """

    reconfig_ops: frozenset[str]
    m: frozenset[str]
    mcs: SubDAG
    component_list: tuple[SubDAG, ...]
    heads: tuple[tuple[str, ...], ...]
    marker_edges: frozenset[tuple[str, str]]

    def component_of(self, op: str) -> SubDAG | None:
        for c in self.component_list:
            if op in c.vertices:
                return c
        return None

    def longest_path_length(self) -> int:
        """Max over components of the longest path (in edges) — the metric
        reported in Tables 4–6."""
        return max(
            (_longest(c) for c in self.component_list),
            default=0,
        )


def _longest(comp: SubDAG) -> int:
    # Longest path within a component by DP over its (acyclic) edge set.
    out: dict[str, list[str]] = {v: [] for v in comp.vertices}
    indeg: dict[str, int] = {v: 0 for v in comp.vertices}
    for a, b in comp.edges:
        out[a].append(b)
        indeg[b] += 1
    order: list[str] = [v for v in comp.vertices if indeg[v] == 0]
    dist = {v: 0 for v in comp.vertices}
    i = 0
    while i < len(order):
        v = order[i]
        i += 1
        for w in out[v]:
            dist[w] = max(dist[w], dist[v] + 1)
            indeg[w] -= 1
            if indeg[w] == 0:
                order.append(w)
    return max(dist.values(), default=0)


def _plan_from_m(dag: DAG, reconfig_ops: frozenset[str], m: set[str]) -> ReconfigPlan:
    mcs = find_mcs(dag, m)
    comps = tuple(components(dag, mcs))
    heads = tuple(tuple(head_operators(c)) for c in comps)
    marker_edges = frozenset(e for c in comps for e in c.edges)
    return ReconfigPlan(
        reconfig_ops=reconfig_ops,
        m=frozenset(m),
        mcs=mcs,
        component_list=comps,
        heads=heads,
        marker_edges=marker_edges,
    )


def plan_one_to_one(dag: DAG, reconfig_ops: Iterable[str]) -> ReconfigPlan:
    """Algorithm 2 — valid only for dataflows with one-to-one operators.

    Raises ``ValueError`` if the dataflow contains a one-to-many operator
    upstream of a reconfiguration operator (Algorithm 3 is required then).
    """
    ops = frozenset(reconfig_ops)
    for o in ops:
        bad = ancestor_one_to_many(dag, o)
        if bad:
            raise ValueError(
                f"operator {o!r} has one-to-many ancestors {sorted(bad)}; "
                "use plan_general (Algorithm 3/4)"
            )
    return _plan_from_m(dag, ops, set(ops))


def plan_general(dag: DAG, reconfig_ops: Iterable[str], *, prune: bool = True) -> ReconfigPlan:
    """Algorithm 3 (``prune=False``) / Algorithm 4 (``prune=True``).

    For each reconfiguration operator, its earliest ancestor one-to-many
    operators (after optional §6.3 pruning) are added to M before the MCS
    is computed, so marker propagation starts at the fan-out points.
    """
    ops = frozenset(reconfig_ops)
    m: set[str] = set(ops)
    for o in ops:
        anc = ancestor_one_to_many(dag, o)
        if prune:
            anc = prune_ancestors(dag, anc, o, set(ops))
        m |= earliest_ancestors(dag, anc)
    return _plan_from_m(dag, ops, m)


def plan_epoch(dag: DAG, reconfig_ops: Iterable[str]) -> ReconfigPlan:
    """The EBR baseline expressed in the same plan shape: markers are
    injected at every source and aligned over the whole DAG, so the "MCS"
    is the entire dataflow and every source is a head."""
    ops = frozenset(reconfig_ops)
    vs = frozenset(dag.vertices)
    whole = SubDAG(vs, frozenset(dag.edges))
    return ReconfigPlan(
        reconfig_ops=ops,
        m=vs,
        mcs=whole,
        component_list=(whole,),
        heads=(tuple(sorted(dag.sources())),),
        marker_edges=frozenset(dag.edges),
    )
