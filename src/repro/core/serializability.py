"""Conflict-serializability checking of recorded schedules (Defs 4.7–4.9).

The schedules this paper considers contain exactly one function-update
transaction plus many data transactions, and the only conflicts are
between a data operation φ(t, o) and an update operation μ(o) on the same
operator (Def 4.6). The precedence graph is therefore a star around the
update transaction U: a cycle exists iff some data transaction T has a
conflicting operation *before* one of U's μ's and another *after* — i.e.
the transaction observed both old and new configurations on reconfigured
operators. ``check`` exploits this; ``check_brute_force`` is the
permutation-based reference used in tests (Def 4.9 applied literally).
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import permutations

from .transactions import (
    DataOp,
    Schedule,
    UpdateOp,
    conflicting,
    txn_of,
)


@dataclass(frozen=True)
class Verdict:
    """Result of a serializability check.

    ``violations`` lists (txn, operator_before, operator_after): data
    transaction ``txn`` hit operator ``operator_before`` pre-update and
    operator ``operator_after`` post-update.
    """

    serializable: bool
    violations: tuple[tuple[int, str, str], ...] = ()


def check(schedule: Schedule) -> Verdict:
    """Linear-time conflict-serializability check for one update txn."""
    updated: set[str] = set()  # operators whose μ has appeared so far
    before: dict[int, str] = {}  # txn -> an op it touched pre-μ (conflicting)
    after: dict[int, str] = {}  # txn -> an op it touched post-μ
    reconfig_ops = {op.operator for op in schedule if isinstance(op, UpdateOp)}
    violations: list[tuple[int, str, str]] = []
    flagged: set[int] = set()
    for op in schedule:
        if isinstance(op, UpdateOp):
            updated.add(op.operator)
        elif op.operator in reconfig_ops:
            t = op.txn
            if op.operator in updated:
                after.setdefault(t, op.operator)
            else:
                before.setdefault(t, op.operator)
            if t in before and t in after and t not in flagged:
                flagged.add(t)
                violations.append((t, before[t], after[t]))
    return Verdict(serializable=not violations, violations=tuple(violations))


def check_brute_force(schedule: Schedule) -> bool:
    """Def 4.9 literally: try every serial order of the transactions and
    test conflict-equivalence (Def 4.8). Exponential — tests only."""
    txns = list(schedule.transactions())
    ops = schedule.ops
    # Pairwise conflict orders observed in the schedule.
    observed: set[tuple[int, int, str]] = set()
    for i, a in enumerate(ops):
        for b in ops[i + 1 :]:
            if conflicting(a, b):
                observed.add((txn_of(a), txn_of(b), a.operator if isinstance(a, DataOp) else b.operator))
    for perm in permutations(txns):
        pos = {t: i for i, t in enumerate(perm)}
        if all(pos[ta] < pos[tb] for ta, tb, _ in observed):
            return True
    return False


def mixed_version_transactions(schedule: Schedule) -> set[int]:
    """Transactions processed under both configurations — the observable
    anomaly (schema mismatch etc.) behind non-serializability."""
    return {t for t, _, _ in check(schedule).violations}
