"""Tests for the §6.3 MCS pruning rules (Figures 9 and 10)."""
from repro.core.dag import DAG
from repro.core.pruning import (
    ancestor_one_to_many,
    can_prune_edgewise,
    can_prune_uniqueness,
    earliest_ancestors,
    prune_ancestors,
)


def fig9_i() -> DAG:
    # RE replicates to C and D; reconfig on E (downstream of C only).
    return DAG.from_edges(
        [("s", "RE"), ("RE", "C"), ("RE", "D"), ("C", "E")],
        edgewise_one_to_one=["RE"],
    )


def fig9_ii() -> DAG:
    # Reconfig on E and F, one on each branch: cannot prune.
    return DAG.from_edges(
        [("s", "RE"), ("RE", "C"), ("RE", "D"), ("C", "E"), ("D", "F")],
        edgewise_one_to_one=["RE"],
    )


def fig9_iii() -> DAG:
    # X receives all replicated tuples; reconfig on E after X: cannot prune.
    return DAG.from_edges(
        [("s", "RE"), ("RE", "C"), ("RE", "D"), ("C", "X"), ("D", "X"), ("X", "E")],
        edgewise_one_to_one=["RE"],
    )


def fig10() -> DAG:
    # RE -> {C, D} -> SJ (self-join on key) -> E; reconfig on E.
    return DAG.from_edges(
        [("s", "RE"), ("RE", "C"), ("RE", "D"), ("C", "SJ"), ("D", "SJ"), ("SJ", "E")],
        edgewise_one_to_one=["RE"],
        unique_per_txn=["SJ"],
    )


class TestAncestors:
    def test_ancestor_one_to_many(self):
        d = fig9_i()
        assert ancestor_one_to_many(d, "E") == {"RE"}
        assert ancestor_one_to_many(d, "RE") == set()

    def test_earliest_ancestors_single(self):
        d = fig9_i()
        assert earliest_ancestors(d, {"RE"}) == {"RE"}

    def test_earliest_ancestors_chain(self):
        # J1 -> J2 (both one-to-many): earliest is the most upstream J1.
        d = DAG.from_edges([("s", "J1"), ("J1", "J2"), ("J2", "o")],
                           one_to_many=["J1", "J2"])
        assert earliest_ancestors(d, {"J1", "J2"}) == {"J1"}

    def test_earliest_ancestors_parallel(self):
        # FMX, FMY in parallel branches (the §6.2 example): both earliest.
        d = DAG.from_edges(
            [("s", "FMX"), ("s", "FMY"), ("FMX", "U"), ("FMY", "U")],
            one_to_many=["FMX", "FMY"],
        )
        assert earliest_ancestors(d, {"FMX", "FMY"}) == {"FMX", "FMY"}


class TestEdgewiseRule:
    def test_fig9_i_prunable(self):
        d = fig9_i()
        assert can_prune_edgewise(d, "RE", "E", {"E"})
        assert prune_ancestors(d, {"RE"}, "E", {"E"}) == set()

    def test_fig9_ii_not_prunable(self):
        d = fig9_ii()
        assert not can_prune_edgewise(d, "RE", "E", {"E", "F"})
        assert not can_prune_edgewise(d, "RE", "F", {"E", "F"})
        assert prune_ancestors(d, {"RE"}, "E", {"E", "F"}) == {"RE"}

    def test_fig9_iii_not_prunable(self):
        d = fig9_iii()
        # Both RE output edges reach E (through X).
        assert not can_prune_edgewise(d, "RE", "E", {"E"})

    def test_requires_edgewise_property(self):
        # A true one-to-many (join) ancestor is never edge-wise prunable.
        d = DAG.from_edges([("s", "J"), ("J", "C"), ("C", "E")], one_to_many=["J"])
        assert not can_prune_edgewise(d, "J", "E", {"E"})

    def test_single_relevant_edge_must_lead_to_target(self):
        # RE's only reconfig-reaching edge leads to F, and we ask about E
        # upstream on the other branch: rule must not fire for mismatched o_i.
        d = DAG.from_edges(
            [("s", "RE"), ("RE", "C"), ("RE", "D"), ("C", "E"), ("D", "F")],
            edgewise_one_to_one=["RE"],
        )
        assert can_prune_edgewise(d, "RE", "F", {"F"})
        assert not can_prune_edgewise(d, "RE", "E", {"F"})


class TestUniquenessRule:
    def test_fig10_prunable(self):
        d = fig10()
        assert can_prune_uniqueness(d, "RE", "E")
        assert prune_ancestors(d, {"RE"}, "E", {"E"}) == set()

    def test_not_prunable_without_unique_op(self):
        d = fig9_iii()
        assert not can_prune_uniqueness(d, "RE", "E")

    def test_partial_coverage_not_prunable(self):
        # One path through SJ, one path bypassing it: cannot prune.
        d = DAG.from_edges(
            [("s", "RE"), ("RE", "C"), ("RE", "D"), ("C", "SJ"), ("SJ", "E"), ("D", "E")],
            edgewise_one_to_one=["RE"],
            unique_per_txn=["SJ"],
        )
        assert not can_prune_uniqueness(d, "RE", "E")

    def test_no_path_returns_false(self):
        d = fig10()
        assert not can_prune_uniqueness(d, "E", "RE")

    def test_reconfig_on_unique_op_itself(self):
        # Reconfiguring SJ itself: paths RE->SJ have no *interior* unique op.
        d = fig10()
        assert not can_prune_uniqueness(d, "RE", "SJ")

    def test_both_rules_interact_in_prune_ancestors(self):
        d = fig10()
        # For target C (directly under RE, both branches relevant? only C):
        assert prune_ancestors(d, {"RE"}, "C", {"C"}) == set()  # edgewise fires
