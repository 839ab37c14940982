"""Tests for the script-driven Spark data plane (repro.engine.exec_spark)."""
import pytest

from repro.core.script import parse_script
from repro.engine.exec_spark import run_with_script, script_to_dop_schedule
from repro.oracle import assert_equivalent
from repro.queries.tpch import QUERIES, load_tables

SF = 0.005


@pytest.fixture(scope="module")
def tables(spark):
    return load_tables(spark, ["lineitem", "orders", "customer"], sf=SF)


class TestScheduleDerivation:
    def test_one_batch_per_action(self):
        acts = parse_script("AP S1,2,4 @ 10\nAP S1,4,8 @ 20")
        assert script_to_dop_schedule(acts, initial_dop=2) == [2, 4, 8]

    def test_rp_action_lowers_dop(self):
        acts = parse_script("AP S1,2,8 @ 10\nRP S1,8,2 @ 30")
        assert script_to_dop_schedule(acts) == [2, 8, 2]

    def test_constraint_actions_ignored(self):
        acts = parse_script("CONSTRAINT S1,30 @ 150\nAP S1,2,4 @ 10")
        assert script_to_dop_schedule(acts) == [2, 4]

    def test_actions_applied_in_time_order(self):
        acts = parse_script("AP S1,4,8 @ 20\nAP S1,2,4 @ 10")
        assert script_to_dop_schedule(acts) == [2, 4, 8]

    def test_empty_script(self):
        assert script_to_dop_schedule([], initial_dop=3) == [3]


class TestRealExecution:
    def test_q2j_with_paper_script_matches_oracle(self, spark, tables):
        qdef = QUERIES["Q2J"]
        res = run_with_script(
            spark, "Q2J", tables, "AP S1,2,4 @ 120\nAP S1,4,6 @ 290\nAP S1,6,8 @ 450"
        )
        assert res.schedule == [2, 4, 6, 8]
        assert res.run.batch_dops == [2, 4, 6, 8]
        assert_equivalent(
            res.result, qdef.duckdb_sql, **{t: tables[t] for t in qdef.tables}
        )

    def test_q3_with_mixed_script_matches_oracle(self, spark, tables):
        qdef = QUERIES["Q3"]
        res = run_with_script(spark, "Q3", tables, "AP S1,2,8 @ 5\nRP S1,8,4 @ 50")
        assert res.schedule == [2, 8, 4]
        assert_equivalent(
            res.result, qdef.duckdb_sql, **{t: tables[t] for t in qdef.tables}
        )
