"""Tests for fragment→pipeline lowering and drivers (repro.engine.pipeline)."""
import pytest

from repro.engine import plan as P
from repro.engine.pipeline import Driver, Pipeline, fragment_to_pipelines
from repro.engine.operators import OperatorFactory
from repro.engine.pages import Page, end_page


def _stage3_like_fragment():
    """The paper's Fig. 6 example: a fragment with a local exchange feeding
    a hash join's build side, probed by a remote source."""
    probe = P.PlanNode(P.REMOTE_SOURCE, props={"stage_id": 4, "role": "probe"})
    build_src = P.PlanNode(P.REMOTE_SOURCE, props={"stage_id": 5, "role": "build"})
    build = P.local_exchange(build_src)
    join = P.hash_join(probe, build, partitioned=False)
    return P.Fragment(stage_id=3, root=join)


class TestLowering:
    def test_fig6_pipeline_count(self):
        # Fig. 6/7: exchange->sink, source->build, exchange->probe->output
        pipes = fragment_to_pipelines(_stage3_like_fragment())
        assert len(pipes) == 3

    def test_fig6_pipeline_shapes(self):
        p0, p1, p2 = fragment_to_pipelines(_stage3_like_fragment())
        assert p0.kinds() == ["exchange", "sink"]
        assert p1.kinds() == ["source", "build"]
        assert p2.kinds() == ["exchange", "probe", "task_output"]

    def test_output_operator_appended(self):
        frag = P.Fragment(0, P.scan("t"))
        (pipe,) = fragment_to_pipelines(frag)
        assert pipe.kinds() == ["table_scan", "task_output"]

    def test_scan_filter_partial_agg_chain(self):
        frag = P.Fragment(1, P.partial_agg(P.filter_(P.scan("t"), "pred")))
        (pipe,) = fragment_to_pipelines(frag)
        assert pipe.kinds() == ["table_scan", "filter", "partial_agg", "task_output"]

    def test_shuffle_stage_pipeline(self):
        # §4.6: shuffle stage = exchange operator + task output operator
        src = P.PlanNode(P.REMOTE_SOURCE, props={"stage_id": 3, "role": "input"})
        frag = P.Fragment(2, P.PlanNode(P.SHUFFLE, [src]))
        (pipe,) = fragment_to_pipelines(frag)
        assert pipe.kinds() == ["exchange", "shuffle", "task_output"]

    def test_probe_selectivity_from_out_ratio(self):
        probe = P.PlanNode(P.REMOTE_SOURCE, props={"role": "probe"})
        build = P.PlanNode(P.REMOTE_SOURCE, props={"role": "build"})
        frag = P.Fragment(1, P.hash_join(probe, build, partitioned=True, out_ratio=0.25))
        pipes = fragment_to_pipelines(frag)
        probe_pipe = pipes[-1]
        fac = next(f for f in probe_pipe.factories if f.kind == "probe")
        assert fac.selectivity == 0.25

    def test_pipeline_classifiers(self):
        p0, p1, p2 = fragment_to_pipelines(_stage3_like_fragment())
        assert p0.is_exchange_pipeline()
        assert p1.is_source_pipeline()
        assert p2.is_output_pipeline()


class TestDrivers:
    def _pipe(self):
        return Pipeline(0, [OperatorFactory("exchange"),
                            OperatorFactory("filter", selectivity=0.5),
                            OperatorFactory("task_output")])

    def test_new_driver_instantiates_operators(self):
        # §2: pipeline is to driver as class is to object
        pipe = self._pipe()
        d = pipe.new_driver()
        assert [op.kind for op in d.operators] == ["exchange", "filter", "task_output"]
        assert pipe.dop == 1

    def test_driver_ids_unique(self):
        pipe = self._pipe()
        a, b = pipe.new_driver(), pipe.new_driver()
        assert a.driver_id != b.driver_id

    def test_push_chains_operators(self):
        d = self._pipe().new_driver()
        out = d.push(Page(rows=100, bytes=1000))
        assert out[0].rows == 50

    def test_push_end_page_finishes_driver(self):
        d = self._pipe().new_driver()
        out = d.push(end_page())
        assert d.finished()
        assert out[-1].is_end

    def test_remove_driver_closes_via_end_page(self):
        # §4.3 decreasing task DOP
        pipe = self._pipe()
        pipe.new_driver()
        d = pipe.remove_driver()
        assert pipe.dop == 0
        assert d.finished()

    def test_remove_driver_empty_returns_none(self):
        assert self._pipe().remove_driver() is None
