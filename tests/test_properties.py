"""Property-based tests (hypothesis) for the engine substrate invariants."""
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.engine import plan as P
from repro.engine.buffers import RuntimeElasticBuffer
from repro.engine.exec_sim import ByteElasticBuffer
from repro.engine.operators import Operator
from repro.engine.pages import Page, end_page, paginate
from repro.engine.splits import SplitSource

# random physical plans: scans at the leaves, joins/filters above, every
# fragment boundary marked by an exchange (as the optimizer would)
_plans = st.recursive(
    st.sampled_from(["lineitem", "orders", "customer"]).map(
        lambda t: P.exchange(P.scan(t))
    ),
    lambda children: st.tuples(children, children, st.booleans()).map(
        lambda pb: P.exchange(P.hash_join(pb[0], pb[1], partitioned=pb[2]))
    ),
    max_leaves=6,
)


class TestFragmentationProperties:
    @given(plan=_plans)
    @settings(max_examples=60, deadline=None)
    def test_fragmentation_invariants(self, plan):
        tree = P.fragment_plan(P.output(P.final_agg(plan)))
        ids = tree.stage_ids()
        # ids are unique, contiguous from 0, root is 0
        assert ids == list(range(len(ids)))
        assert tree.root_id == 0
        # every non-root fragment has exactly one parent, and the parent's
        # source list points back at it
        for sid in ids[1:]:
            parent = tree.parent_of(sid)
            assert parent is not None
            assert sid in tree[parent].source_stage_ids()
        # topological order visits children before parents, root last
        order = tree.topological()
        assert set(order) == set(ids) and order[-1] == 0
        for sid in ids:
            for child in tree.children_of(sid):
                assert order.index(child) < order.index(sid)
        # every join fragment has exactly one probe and one build source
        for sid in ids:
            frag = tree[sid]
            if frag.has_join():
                assert frag.probe_source() is not None
                assert frag.build_source() is not None


class TestPaginateProperties:
    @given(total=st.integers(min_value=1, max_value=50_000_000),
           rows=st.integers(min_value=1, max_value=100_000))
    @settings(max_examples=60, deadline=None)
    def test_bytes_and_rows_conserved(self, total, rows):
        pages = paginate(total, rows)
        assert sum(p.bytes for p in pages) == total
        assert sum(p.rows for p in pages) == rows
        assert all(not p.is_end for p in pages)


class TestSplitProperties:
    @given(n_rows=st.integers(min_value=1, max_value=2000),
           n_nodes=st.integers(min_value=1, max_value=10),
           spn=st.integers(min_value=1, max_value=7))
    @settings(max_examples=40, deadline=None)
    def test_splits_partition_rows_exactly(self, n_rows, n_nodes, spn):
        pdf = pd.DataFrame({"k": range(n_rows)})
        src = SplitSource("t", pdf, n_nodes=n_nodes, splits_per_node=spn)
        assert len(src) == n_nodes * spn
        covered = [i for s in src.splits for i in range(s.start, s.stop)]
        assert covered == list(range(n_rows))
        assert len({s.split_id for s in src.splits}) == len(src)


class TestOperatorProperties:
    @given(pages=st.lists(
        st.tuples(st.integers(0, 10_000), st.integers(0, 1_000_000)),
        min_size=0, max_size=30),
        sel=st.floats(min_value=0.0, max_value=1.0))
    @settings(max_examples=60, deadline=None)
    def test_stateless_conservation_bounds(self, pages, sel):
        op = Operator("filter", selectivity=sel)
        for rows, nbytes in pages:
            op.process(Page(rows=rows, bytes=nbytes))
        out = op.process(end_page())
        assert out[-1].is_end
        assert op.rows_out <= op.rows_in
        assert op.bytes_out <= op.bytes_in
        assert op.state == "finished"

    @given(pages=st.lists(
        st.tuples(st.integers(0, 10_000), st.integers(0, 1_000_000)),
        min_size=1, max_size=30))
    @settings(max_examples=40, deadline=None)
    def test_stateful_flushes_everything_at_end(self, pages):
        op = Operator("final_agg", selectivity=1.0)
        for rows, nbytes in pages:
            assert op.process(Page(rows=rows, bytes=nbytes)) == []
        op.process(end_page())
        assert op.rows_out == op.rows_in


class TestElasticBufferProperties:
    @given(ops=st.lists(st.sampled_from(["offer", "pull", "tick"]),
                        min_size=1, max_size=200))
    @settings(max_examples=40, deadline=None)
    def test_queue_never_exceeds_capacity_plus_ends(self, ops):
        b = RuntimeElasticBuffer()
        t = 0.0
        for op in ops:
            if op == "offer":
                b.offer(Page(rows=1, bytes=100))
            elif op == "pull":
                b.pull()
            else:
                t += 0.6
                b.tick(t)
            data_pages = sum(1 for p in b.queue if not p.is_end)
            assert data_pages <= b.capacity_pages
            assert b.capacity_pages >= 1

    @given(amounts=st.lists(st.floats(min_value=0.0, max_value=1e8),
                            min_size=1, max_size=50))
    @settings(max_examples=40, deadline=None)
    def test_byte_buffer_take_never_exceeds_pushed(self, amounts):
        b = ByteElasticBuffer()
        pushed = taken = 0.0
        for a in amounts:
            b.push(a)
            pushed += a
            taken += b.take(a / 2 + 1.0)
        assert taken <= pushed + 1e-6
        assert b.level >= -1e-6
