"""Engine substrate tests: channels, workers, routing, backpressure."""
import pytest

from repro.core.dag import DAG
from repro.engine import KeyDist, OpSpec, Simulator, WorkflowSpec
from repro.engine.workload import EdgeSpec


def chain_spec(**src_kw) -> WorkflowSpec:
    dag = DAG.from_edges([("src", "A"), ("A", "B"), ("B", "sink")])
    ops = {
        "src": OpSpec("src", kind="source", rate=1000, n_tuples=50,
                      key_dist=KeyDist.uniform(10), **src_kw),
        "A": OpSpec("A", kind="map", cost={1: 0.0001}),
        "B": OpSpec("B", kind="map", cost={1: 0.0001}),
        "sink": OpSpec("sink", kind="sink"),
    }
    return WorkflowSpec(dag=dag, ops=ops)


class TestBasicFlow:
    def test_all_tuples_reach_sink(self):
        sim = Simulator(chain_spec(), sink_log=True)
        sim.start()
        sim.run()
        assert len(sim.sink_log) == 50

    def test_deterministic(self):
        def run():
            sim = Simulator(chain_spec(), sink_log=True)
            sim.start()
            sim.run()
            return sim.sink_log

        assert run() == run()

    def test_latency_positive_and_ordered(self):
        sim = Simulator(chain_spec(), sink_log=True)
        sim.start()
        sim.run()
        for arrival, created, _ in sim.sink_log:
            assert arrival > created

    def test_source_rate_respected(self):
        sim = Simulator(chain_spec(), sink_log=True)
        sim.start()
        sim.run()
        last_arrival = max(t for t, _, _ in sim.sink_log)
        # 50 tuples at 1000/s -> last emitted ~0.05s; plus channel latency.
        assert 0.04 < last_arrival < 0.2

    def test_txn_ids_unique(self):
        sim = Simulator(chain_spec(), sink_log=True)
        sim.start()
        sim.run()
        txns = [t for _, _, t in sim.sink_log]
        assert len(set(txns)) == 50


class TestOperatorKinds:
    def _run(self, mid_spec: OpSpec, out_edges=None, n=100):
        edges = out_edges or [("src", "M"), ("M", "sink")]
        dag = DAG.from_edges(edges, one_to_many=["M"] if mid_spec.kind == "join" and mid_spec.fanout > 1 else [])
        ops = {"src": OpSpec("src", kind="source", rate=10000, n_tuples=n,
                             key_dist=KeyDist.uniform(10)),
               "M": mid_spec}
        for v in dag.vertices:
            if v.startswith("sink"):
                ops[v] = OpSpec(v, kind="sink")
        spec = WorkflowSpec(dag=dag, ops=ops)
        sim = Simulator(spec, sink_log=True)
        sim.start()
        sim.run()
        return sim

    def test_filter_selectivity(self):
        sim = self._run(OpSpec("M", kind="filter", selectivity=0.5), n=400)
        assert 100 < len(sim.sink_log) < 300

    def test_filter_selectivity_one(self):
        sim = self._run(OpSpec("M", kind="filter", selectivity=1.0), n=100)
        assert len(sim.sink_log) == 100

    def test_join_fanout(self):
        sim = self._run(OpSpec("M", kind="join", fanout=3), n=100)
        assert len(sim.sink_log) == 300

    def test_join_rekey(self):
        sim = self._run(
            OpSpec("M", kind="join", fanout=1, out_key=KeyDist.uniform(5)), n=50
        )
        assert len(sim.sink_log) == 50

    def test_replicate_emits_per_edge(self):
        sim = self._run(
            OpSpec("M", kind="replicate"),
            out_edges=[("src", "M"), ("M", "sink1"), ("M", "sink2")],
            n=80,
        )
        assert len(sim.sink_log) == 160

    def test_split_routes_to_one_edge(self):
        sim = self._run(
            OpSpec("M", kind="split"),
            out_edges=[("src", "M"), ("M", "sink1"), ("M", "sink2")],
            n=80,
        )
        assert len(sim.sink_log) == 80

    def test_union_passthrough(self):
        sim = self._run(OpSpec("M", kind="union"), n=60)
        assert len(sim.sink_log) == 60


class TestSelfJoin:
    def test_selfjoin_combines_replicas(self):
        dag = DAG.from_edges(
            [("src", "RE"), ("RE", "A"), ("RE", "B"), ("A", "SJ"), ("B", "SJ"),
             ("SJ", "sink")],
            edgewise_one_to_one=["RE"],
            unique_per_txn=["SJ"],
        )
        ops = {
            "src": OpSpec("src", kind="source", rate=5000, n_tuples=100,
                          key_dist=KeyDist.uniform(10)),
            "RE": OpSpec("RE", kind="replicate"),
            "A": OpSpec("A", kind="map"),
            "B": OpSpec("B", kind="map"),
            "SJ": OpSpec("SJ", kind="selfjoin", arity=2),
            "sink": OpSpec("sink", kind="sink"),
        }
        sim = Simulator(WorkflowSpec(dag=dag, ops=ops), sink_log=True)
        sim.start()
        sim.run()
        # Exactly one combined tuple per transaction.
        assert len(sim.sink_log) == 100
        assert len({t for _, _, t in sim.sink_log}) == 100

    def test_selfjoin_parallel_workers_keyed_routing(self):
        dag = DAG.from_edges(
            [("src", "RE"), ("RE", "A"), ("RE", "B"), ("A", "SJ"), ("B", "SJ"),
             ("SJ", "sink")],
            edgewise_one_to_one=["RE"],
            unique_per_txn=["SJ"],
        )
        ops = {
            "src": OpSpec("src", kind="source", rate=5000, n_tuples=100,
                          key_dist=KeyDist.uniform(50)),
            "RE": OpSpec("RE", kind="replicate", parallelism=3),
            "A": OpSpec("A", kind="map", parallelism=3),
            "B": OpSpec("B", kind="map", parallelism=3),
            "SJ": OpSpec("SJ", kind="selfjoin", arity=2, parallelism=3),
            "sink": OpSpec("sink", kind="sink"),
        }
        sim = Simulator(WorkflowSpec(dag=dag, ops=ops), sink_log=True)
        sim.start()
        sim.run()
        # Hash routing sends both replicas of a key to the same SJ worker.
        assert len(sim.sink_log) == 100


class TestBackpressure:
    def make(self, capacity: int):
        dag = DAG.from_edges([("src", "slow"), ("slow", "sink")])
        ops = {
            "src": OpSpec("src", kind="source", rate=1000, n_tuples=200,
                          key_dist=KeyDist.uniform(4)),
            "slow": OpSpec("slow", kind="map", cost={1: 0.01}),  # 100/s max
            "sink": OpSpec("sink", kind="sink"),
        }
        edges = {("src", "slow"): EdgeSpec("hash", capacity=capacity),
                 ("slow", "sink"): EdgeSpec("hash", capacity=capacity)}
        return WorkflowSpec(dag=dag, ops=ops, edges=edges)

    def test_capacity_respected(self):
        sim = Simulator(self.make(capacity=10))
        sim.start()
        sim.run(until=0.1)
        for ch in sim.channels:
            assert ch.data_load() <= 10

    def test_backpressure_slows_source_not_loses_tuples(self):
        sim = Simulator(self.make(capacity=5), sink_log=True)
        sim.start()
        sim.run()
        assert len(sim.sink_log) == 200
        # Completion takes ~200/100 = 2s, far beyond the source's 0.2s.
        assert max(t for t, _, _ in sim.sink_log) > 1.5

    def test_large_capacity_buffers_inflight(self):
        sim = Simulator(self.make(capacity=10_000))
        sim.start()
        sim.run(until=0.2)
        total = sum(ch.data_load() for ch in sim.channels)
        assert total > 100  # backlog accumulated in the channel


class TestParallelRouting:
    def test_hash_partitioning_groups_keys(self):
        dag = DAG.from_edges([("src", "A"), ("A", "sink")])
        ops = {
            "src": OpSpec("src", kind="source", rate=10000, n_tuples=300,
                          key_dist=KeyDist.uniform(16)),
            "A": OpSpec("A", kind="map", parallelism=4),
            "sink": OpSpec("sink", kind="sink"),
        }
        sim = Simulator(WorkflowSpec(dag=dag, ops=ops), sink_log=True)
        sim.start()
        sim.run()
        assert len(sim.sink_log) == 300
        processed = {w.name: w.processed for op in ["A"] for w in sim.by_op[op]}
        assert sum(processed.values()) == 300
        assert all(v > 0 for v in processed.values())

    def test_forward_requires_equal_parallelism(self):
        dag = DAG.from_edges([("src", "A"), ("A", "sink")])
        ops = {
            "src": OpSpec("src", kind="source", parallelism=2, rate=100, n_tuples=4),
            "A": OpSpec("A", kind="map", parallelism=3),
            "sink": OpSpec("sink", kind="sink"),
        }
        edges = {("src", "A"): EdgeSpec("forward")}
        with pytest.raises(ValueError, match="forward"):
            Simulator(WorkflowSpec(dag=dag, ops=ops, edges=edges))

    def test_broadcast_reaches_all_workers(self):
        dag = DAG.from_edges([("src", "A"), ("A", "sink")])
        ops = {
            "src": OpSpec("src", kind="source", rate=10000, n_tuples=50,
                          key_dist=KeyDist.uniform(8)),
            "A": OpSpec("A", kind="map", parallelism=4),
            "sink": OpSpec("sink", kind="sink"),
        }
        edges = {("src", "A"): EdgeSpec("broadcast"), ("A", "sink"): EdgeSpec("hash")}
        sim = Simulator(WorkflowSpec(dag=dag, ops=ops, edges=edges), sink_log=True)
        sim.start()
        sim.run()
        assert len(sim.sink_log) == 200  # each tuple processed by all 4 workers
