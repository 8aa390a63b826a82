"""Tests for the table harnesses at reduced scale (the full-scale runs are
the benchmarks; here we check structure, monotonicity, and exactness of the
graph-only table)."""
import math

import pytest

from repro.engine.schedulers import EpochScheduler, FriesScheduler
from repro.experiments import (
    PAPER_TABLE4,
    PAPER_TABLE7,
    format_table,
    mcs_desc,
    plan_of,
    run_delay,
    table7_rows,
)
from repro.workflows import defs


class TestTable7:
    def test_matches_paper_exactly(self):
        for row in table7_rows():
            assert row["channels_all"] == row["paper_channels_all"]
            assert row["channels_mcs"] == row["paper_channels_mcs"]

    def test_row_count(self):
        assert len(table7_rows()) == len(PAPER_TABLE7) == 5


class TestRunDelay:
    def test_completes_and_positive(self):
        build = lambda: defs.w2(parallelism=2, rate=2000)
        d = run_delay(build, FriesScheduler(), {"J1"}, warmup=2.0, t_max=60.0)
        assert 0 < d < 60_000

    def test_incomplete_returns_inf(self):
        build = lambda: defs.w2(parallelism=2, rate=2000)
        # t_max == warmup: no time to complete.
        d = run_delay(build, EpochScheduler(), {"J4"}, warmup=2.0, t_max=2.0)
        assert math.isinf(d)

    def test_fries_leq_epoch_small_scale(self):
        build = lambda: defs.w2(parallelism=2, rate=2000)
        f = run_delay(build, FriesScheduler(), {"J1"}, warmup=2.0, t_max=60.0)
        e = run_delay(build, EpochScheduler(), {"J1"}, warmup=2.0, t_max=60.0)
        assert f <= e


class TestPlanRendering:
    def test_mcs_desc_heads_bold(self):
        plan = plan_of(defs.w2(parallelism=2), {"J1", "J4"})
        assert mcs_desc(plan) == "{*J1*, J2, J3, J4}"

    def test_mcs_desc_multiple_components(self):
        plan = plan_of(defs.w3(parallelism=2), {"J5", "J6"})
        assert mcs_desc(plan) == "{*J5*} {*J6*}"

    def test_paper_table4_mcs_strings_match_ours(self):
        # Compare as sets of component vertex-sets (head markers stripped,
        # vertex order normalised — the paper lists U1 before J8).
        def norm(s: str):
            comps = s.replace("*", "").strip("{}").split("} {")
            return {frozenset(x.strip() for x in c.split(",")) for c in comps}

        builders = {"W2": defs.w2, "W3": defs.w3}
        for wf, ops, p_mcs, *_ in PAPER_TABLE4:
            plan = plan_of(builders[wf](parallelism=2), set(ops))
            assert norm(mcs_desc(plan)) == norm(p_mcs), (wf, ops)


class TestFormatting:
    def test_format_table_renders(self):
        out = format_table(table7_rows(), "Table 7")
        assert "Table 7" in out and "6,440" in out

    def test_format_empty(self):
        assert "no rows" in format_table([], "X")

    def test_format_inf(self):
        assert "inf" in format_table([{"a": math.inf}], "t")
