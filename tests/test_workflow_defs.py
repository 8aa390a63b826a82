"""Tests for the W1–W5 engine specs (topology, flags, parameters)."""
import pytest

from repro.engine import Simulator
from repro.workflows import defs


class TestW1:
    def test_topology(self):
        s = defs.w1(parallelism=2)
        assert set(s.dag.edges) == {("src", "FD"), ("FD", "sink")}

    def test_model_swap_costs_decrease(self):
        s = defs.w1()
        fd = s.ops["FD"]
        assert fd.cost[1] > fd.cost[2] > fd.cost[3]

    def test_rate_schedule(self):
        s = defs.w1(rate=1000, rate_schedule=[(0, 1000), (100, 2000)])
        assert s.ops["src"].rate_at(50) == 1000
        assert s.ops["src"].rate_at(150) == 2000


class TestW2:
    def test_pipelined_edge_structure(self):
        """4 shuffle edges + 1 chained edge — pinned by Table 7."""
        s = defs.w2(parallelism=2)
        strategies = s.strategies()
        assert sum(1 for v in strategies.values() if v == "hash") == 4
        assert strategies[("J4", "sink")] == "forward"

    def test_total_rate_split_across_workers(self):
        s = defs.w2(parallelism=4, rate=8000)
        assert s.ops["src"].rate == pytest.approx(2000)

    def test_joins_one_to_one(self):
        s = defs.w2()
        for j in ("J1", "J2", "J3", "J4"):
            assert not s.dag.op(j).one_to_many
            assert s.ops[j].fanout == 1

    def test_source_buffer_deeper_than_interior(self):
        s = defs.w2()
        assert s.edge_spec(("src", "J1")).capacity > s.edge_spec(("J1", "J2")).capacity

    def test_builds_simulator(self):
        Simulator(defs.w2(parallelism=2, n_tuples=10))


class TestW3:
    def test_three_channels_union(self):
        s = defs.w3(parallelism=2)
        assert set(s.dag.in_edges("U1")) == {"J5", "J6", "J7"}
        assert s.dag.out_edges("U1") == ["J8"]

    def test_store_channel_fastest(self):
        s = defs.w3(parallelism=2, rate=4000)
        assert s.ops["src_ss"].rate > s.ops["src_cs"].rate > s.ops["src_ws"].rate

    def test_builds_simulator(self):
        Simulator(defs.w3(parallelism=2, n_tuples=10))


class TestW4:
    def test_unnest_is_one_to_many(self):
        s = defs.w4()
        assert s.dag.op("U2").one_to_many
        assert s.ops["U2"].fanout > 1

    def test_chain_order(self):
        s = defs.w4()
        assert s.dag.topological_order() == ["src", "F1", "U2", "FD1", "FD2", "F2", "sink"]

    def test_inference_channels_deep(self):
        s = defs.w4()
        assert s.edge_spec(("U2", "FD1")).capacity > s.edge_spec(("F1", "U2")).capacity

    def test_fd2_heavier_than_fd1(self):
        s = defs.w4()
        assert s.ops["FD2"].cost[1] > s.ops["FD1"].cost[1]

    def test_builds_simulator(self):
        Simulator(defs.w4(parallelism=2, n_tuples=10))


class TestW5:
    def test_replicate_flags(self):
        s = defs.w5()
        re = s.dag.op("RE")
        assert re.one_to_many and re.edgewise_one_to_one

    def test_selfjoin_flags(self):
        s = defs.w5()
        assert s.dag.op("SJ").unique_per_txn
        assert s.ops["SJ"].kind == "selfjoin" and s.ops["SJ"].arity == 2

    def test_two_branches_into_sj(self):
        s = defs.w5()
        assert set(s.dag.in_edges("SJ")) == {"F3", "FD4"}

    def test_fd4_has_straggler(self):
        s = defs.w5()
        assert s.ops["FD4"].straggler.get(0, 1.0) > 1.0

    def test_builds_simulator(self):
        Simulator(defs.w5(parallelism=2, n_tuples=10))


class TestOpSpecBehaviour:
    def test_cost_fallback_to_lower_version(self):
        from repro.engine.workload import OpSpec

        op = OpSpec("x", cost={1: 0.5})
        assert op.cost_at(2, 0) == 0.5  # version 2 falls back to v1 cost

    def test_straggler_multiplier(self):
        from repro.engine.workload import OpSpec

        op = OpSpec("x", cost={1: 0.5}, straggler={1: 2.0})
        assert op.cost_at(1, 1) == 1.0
        assert op.cost_at(1, 0) == 0.5

    def test_unknown_kind_rejected(self):
        from repro.engine.workload import OpSpec

        with pytest.raises(ValueError):
            OpSpec("x", kind="teleport")

    def test_missing_opspec_rejected(self):
        from repro.core.dag import DAG
        from repro.engine.workload import WorkflowSpec

        with pytest.raises(ValueError, match="no OpSpec"):
            WorkflowSpec(dag=DAG.from_edges([("a", "b")]), ops={})

    def test_keydist_zipf_skewed(self):
        import random

        from repro.engine.workload import KeyDist

        d = KeyDist.zipf(100, alpha=1.2)
        rng = random.Random(0)
        samples = [d.sample(rng) for _ in range(2000)]
        top = sum(1 for s in samples if s == 0)
        assert top > 200  # rank-1 key dominates

    def test_keydist_table(self):
        import random

        from repro.engine.workload import KeyDist

        d = KeyDist.table([7, 9], [0.9, 0.1])
        rng = random.Random(1)
        samples = [d.sample(rng) for _ in range(500)]
        assert set(samples) <= {7, 9}
        assert samples.count(7) > 350
