"""Tests for the Spark-side reconfiguration executors: the mini-batch epoch
executor (Table 2's Spark Streaming strategy) and the swap-schedule replay
(consistency of naive/Fries/epoch schedules on real Catalyst execution)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.streaming import (
    count_mixed,
    epoch_schedule,
    fries_schedule,
    mixed_version_txns,
    naive_schedule,
    run_w1_microbatch,
    versions_per_txn,
    w4_with_swap,
)

SF = 0.0001


@pytest.fixture(scope="module")
def pay(spark):
    return synth_data.payments(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def by_user(spark):
    return synth_data.payments_by_user(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def swap_inputs(by_user):
    n = by_user.count()
    total_pays = by_user.select(F.sum(F.size("pays"))).first()[0]
    return by_user, n, total_pays


class TestMicrobatch:
    def test_every_tuple_processed_once(self, spark, pay):
        run = run_w1_microbatch(spark, pay, epoch_size=500)
        assert len(run.output) == pay.count()
        assert run.output.payment_id.is_unique

    def test_reconfig_applies_at_epoch_boundary(self, spark, pay):
        run = run_w1_microbatch(spark, pay, epoch_size=500, request_seq=700)
        assert run.apply_epoch == 2
        out = run.output
        assert (out[out.epoch < 2].version == 1).all()
        assert (out[out.epoch >= 2].version == 2).all()

    def test_epoch_delay_in_tuples(self, spark, pay):
        """The §3.2 limitation: tuples between the request and the epoch
        boundary are still processed with the old configuration."""
        run = run_w1_microbatch(spark, pay, epoch_size=500, request_seq=700)
        assert run.delay_tuples == 300  # seqs 700..999 of epoch 1

    def test_no_mixed_versions_per_epoch(self, spark, pay):
        run = run_w1_microbatch(spark, pay, epoch_size=400, request_seq=100)
        mixed = run.output.groupby("epoch").version.nunique()
        assert (mixed == 1).all()

    def test_state_carries_across_epochs(self, spark, pay):
        """Scores must be identical to a single-epoch run when no reconfig
        happens — i.e. epoch boundaries don't reset operator state."""
        one = run_w1_microbatch(spark, pay, epoch_size=10**9)
        many = run_w1_microbatch(spark, pay, epoch_size=300)
        a = one.output.sort_values("payment_id").score.to_numpy()
        b = many.output.sort_values("payment_id").score.to_numpy()
        assert abs(a - b).max() < 1e-9

    def test_larger_epochs_larger_delay(self, spark, pay):
        d1 = run_w1_microbatch(spark, pay, epoch_size=200, request_seq=100).delay_tuples
        d2 = run_w1_microbatch(spark, pay, epoch_size=1000, request_seq=100).delay_tuples
        assert d2 > d1


class TestSwapSchedules:
    def test_naive_produces_mixed_transactions(self, spark, swap_inputs):
        """The §4.1/§6.1 anomaly on real Spark execution: independent
        per-operator cut points split fanned-out transactions."""
        by_user, _, total = swap_inputs
        out = w4_with_swap(by_user, naive_schedule(total // 2, total // 3), min_payments=2)
        assert count_mixed(out, ["v_FD1", "v_FD2"]) > 0

    def test_fries_schedule_never_mixed(self, spark, swap_inputs):
        by_user, n, _ = swap_inputs
        med = by_user.select(F.expr("percentile(pays[0].seq, 0.5)")).first()[0]
        out = w4_with_swap(by_user, fries_schedule(int(med)), min_payments=2)
        assert count_mixed(out, ["v_FD1", "v_FD2"]) == 0

    def test_epoch_schedule_never_mixed(self, spark, swap_inputs):
        by_user, _, _ = swap_inputs
        out = w4_with_swap(by_user, epoch_schedule(100), min_payments=2)
        assert count_mixed(out, ["v_FD1", "v_FD2"]) == 0

    def test_fries_both_versions_used(self, spark, swap_inputs):
        by_user, _, _ = swap_inputs
        med = by_user.select(F.expr("percentile(pays[0].seq, 0.5)")).first()[0]
        out = w4_with_swap(by_user, fries_schedule(int(med)), min_payments=2)
        versions = {r["v_FD1"] for r in out.select("v_FD1").distinct().collect()}
        assert versions == {1, 2}  # the swap really happened mid-stream

    def test_scores_follow_version(self, spark, swap_inputs):
        """Per-row version selection works: an all-v1 run and an all-v2 run
        produce different scores (heavy vs light model)."""
        by_user, _, _ = swap_inputs
        all_v1 = w4_with_swap(by_user, fries_schedule(1 << 60), min_payments=2)
        all_v2 = w4_with_swap(by_user, fries_schedule(0), min_payments=2)
        s1 = all_v1.agg(F.sum("user_score")).first()[0]
        s2 = all_v2.agg(F.sum("user_score")).first()[0]
        assert s1 != s2


class TestConsistencyModule:
    def test_versions_per_txn_counts(self, spark, swap_inputs):
        by_user, _, total = swap_inputs
        out = w4_with_swap(by_user, naive_schedule(total // 2, total // 3), min_payments=2)
        vpt = versions_per_txn(out, ["v_FD1", "v_FD2"])
        assert {"txn", "n_versions", "min_version", "max_version"} <= set(vpt.columns)
        assert vpt.count() == out.select("txn").distinct().count()

    def test_mixed_txns_subset(self, spark, swap_inputs):
        by_user, _, total = swap_inputs
        out = w4_with_swap(by_user, naive_schedule(total // 2, total // 3), min_payments=2)
        mixed = mixed_version_txns(out, ["v_FD1", "v_FD2"])
        assert mixed.filter(F.col("n_versions") <= 1).count() == 0
