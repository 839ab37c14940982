"""Tests for the query-stage-task runtime info tree (§5.1, Fig. 18)."""
import pytest

from repro.core import RuntimeInfoCollector
from repro.engine.exec_sim import SimExecutor
from tests.test_exec_sim import join_query, linear_query

GB = 1e9


class TestCollector:
    def test_snapshot_structure(self):
        ex = SimExecutor(join_query(partitioned=False), stage_dop=2)
        for _ in range(20):
            ex.step()
        info = RuntimeInfoCollector(ex).collect()
        assert sorted(info.stages) == [0, 1, 2, 3]
        s1 = info[1]
        assert s1.dop == 2
        assert s1.has_join and not s1.partitioned
        assert len(s1.tasks) == 2
        assert s1.tasks[0].task_id == "task1_0"

    def test_scan_stages_listed(self):
        ex = SimExecutor(join_query(partitioned=False))
        info = RuntimeInfoCollector(ex).collect()
        assert {s.stage_id for s in info.scan_stages()} == {2, 3}

    def test_progress_fraction(self):
        ex = SimExecutor(linear_query(scan_bytes=1 * GB))
        for _ in range(50):  # 5 s at 100 MB/s
            ex.step()
        info = RuntimeInfoCollector(ex).collect()
        assert info[1].progress == pytest.approx(0.5, abs=0.05)

    def test_finished_flags_after_run(self):
        ex = SimExecutor(linear_query())
        ex.run()
        info = RuntimeInfoCollector(ex).collect()
        assert info.done
        assert all(s.finished for s in info.stages.values())
        assert all(t.finished for s in info.stages.values() for t in s.tasks)

    def test_history_accumulates(self):
        ex = SimExecutor(linear_query())
        c = RuntimeInfoCollector(ex)
        c.collect()
        for _ in range(10):
            ex.step()
        c.collect()
        assert len(c.history) == 2
        assert c.history[1].t > c.history[0].t

    def test_build_bytes_exposed(self):
        ex = SimExecutor(join_query(build_bytes=0.5 * GB, partitioned=True))
        info = RuntimeInfoCollector(ex).collect()
        assert info[1].build_bytes == pytest.approx(0.5 * GB, rel=0.01)

    def test_remaining_bytes_tracks_scan(self):
        ex = SimExecutor(linear_query(scan_bytes=1 * GB))
        for _ in range(30):
            ex.step()
        info = RuntimeInfoCollector(ex).collect()
        assert info[1].remaining_bytes == pytest.approx(0.7 * GB, rel=0.1)
