"""Tests for plan nodes and fragmentation (repro.engine.plan)."""
import pytest

from repro.engine import plan as P
from repro.queries.tpch import q2_plan, q2j_plan, q3_plan


class TestPlanNodes:
    def test_unknown_kind_rejected(self):
        with pytest.raises(ValueError):
            P.PlanNode("bogus")

    def test_walk_and_find(self):
        pl = q3_plan()
        scans = pl.find(P.TABLE_SCAN)
        assert {s.name for s in scans} == {"lineitem", "orders", "customer"}
        assert len(pl.find(P.HASH_JOIN)) == 2

    def test_join_probe_is_first_child(self):
        j = P.hash_join(P.scan("probe_side"), P.scan("build_side"), partitioned=True)
        assert j.children[0].name == "probe_side"
        assert j.props["partitioned"] is True

    def test_constructors_set_props(self):
        t = P.topn(P.scan("x"), n=5)
        assert t.props["n"] == 5
        f = P.filter_(P.scan("x"), "pred")
        assert f.name == "pred"


class TestFragmentation:
    def test_q3_stage_numbering_matches_paper(self):
        """Fig. 21: S0 output/final, S1 join(lineitem), S2 scan lineitem,
        S3 join(orders,customer), S4 scan orders, S5 scan customer."""
        tree = P.fragment_plan(q3_plan())
        assert tree.stage_ids() == [0, 1, 2, 3, 4, 5]
        assert tree[2].scan_table() == "lineitem"
        assert tree[4].scan_table() == "orders"
        assert tree[5].scan_table() == "customer"
        assert tree[1].has_join() and tree[3].has_join()
        assert not tree[0].has_join()

    def test_q3_probe_build_roles(self):
        tree = P.fragment_plan(q3_plan())
        assert tree[1].probe_source().child_stage_id == 2
        assert tree[1].build_source().child_stage_id == 3
        assert tree[3].probe_source().child_stage_id == 4
        assert tree[3].build_source().child_stage_id == 5

    def test_parent_of(self):
        tree = P.fragment_plan(q3_plan())
        assert tree.parent_of(1) == 0
        assert tree.parent_of(2) == 1
        assert tree.parent_of(5) == 3
        assert tree.parent_of(0) is None

    def test_topological_children_first(self):
        tree = P.fragment_plan(q3_plan())
        order = tree.topological()
        assert order.index(2) < order.index(1)
        assert order.index(5) < order.index(3) < order.index(1)
        assert order[-1] == 0

    def test_remote_source_nodes_in_fragments(self):
        tree = P.fragment_plan(q2j_plan())
        srcs = tree[1].root.find(P.REMOTE_SOURCE)
        assert {s.props["role"] for s in srcs} == {"probe", "build"}

    def test_explicit_stage_ids_q2(self):
        """§6.5.2: Q2's subquery aggregation is S10, its scan S11."""
        root, ids = q2_plan()
        tree = P.fragment_plan(root, stage_ids=ids)
        assert sorted(tree.stage_ids()) == list(range(13))
        assert tree[2].scan_table() == "partsupp"   # upstream scan of S1
        assert tree[11].scan_table() == "partsupp"  # upstream scan of S10
        assert not tree[10].is_scan()               # S10 is the agg stage
        assert tree.parent_of(11) == 10
        assert tree[1].probe_source().child_stage_id == 2

    def test_stage_ids_too_short_raises(self):
        with pytest.raises(ValueError):
            P.fragment_plan(q3_plan(), stage_ids=[0, 1])

    def test_shuffle_fragment_detection(self):
        pl = P.output(
            P.final_agg(P.exchange(P.shuffle_stage_node(P.exchange(P.scan("orders")))))
        )
        tree = P.fragment_plan(pl)
        assert tree[1].is_shuffle()
        assert tree[2].scan_table() == "orders"

    def test_contains_and_getitem(self):
        tree = P.fragment_plan(q2j_plan())
        assert 1 in tree
        assert 99 not in tree
        assert tree[0].stage_id == 0

    def test_single_fragment_plan(self):
        tree = P.fragment_plan(P.output(P.scan("t")))
        assert tree.stage_ids() == [0]
        assert tree[0].is_scan()
