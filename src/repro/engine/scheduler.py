"""Initial scheduling and the dynamic scheduler (§2, §4.3–§4.4).

``schedule_query`` traverses the stage tree bottom-up, creates tasks for
each stage, and establishes communication links (remote splits up, buffer
ids down) — Presto's behaviour, with DOPs fixed before execution.

``DynamicScheduler`` is Accordion's addition: it breaks that early binding
by spawning/terminating tasks (intra-stage DOP, §4.4) and drivers
(intra-task DOP, §4.3) at runtime, confining topology changes to the
upstream/downstream buffers (§4.2). Every control action is charged to the
RPC model, which is where the paper's scheduling overheads (~tens of ms per
adjustment, 313 ms initial plan) come from.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.cluster import Cluster, RpcModel
from repro.engine.buffers import SharedBuffer, ShuffleBuffer
from repro.engine.plan import StageTree
from repro.engine.splits import RemoteSplit
from repro.engine.stage import Stage
from repro.engine.task import Task


@dataclass
class QueryExecution:
    """A scheduled query: stages, their output buffers, and control-plane
    accounting."""

    tree: StageTree
    cluster: Cluster
    stages: dict[int, Stage] = field(default_factory=dict)
    out_buffers: dict[int, SharedBuffer | ShuffleBuffer] = field(default_factory=dict)
    rpc: RpcModel = field(default_factory=RpcModel)
    rpc_requests: int = 0
    control_time_s: float = 0.0
    init_time_s: float = 0.0
    init_rpc_requests: int = 0

    def charge_rpc(self, n_requests: int) -> float:
        """Charge ``n_requests`` RESTful calls; returns their latency."""
        cost = self.rpc.batch_cost_s(n_requests)
        self.rpc_requests += n_requests
        self.control_time_s += cost
        return cost

    def parent_stage(self, stage_id: int) -> Stage | None:
        pid = self.tree.parent_of(stage_id)
        return self.stages[pid] if pid is not None else None

    def child_stages(self, stage_id: int) -> list[Stage]:
        return [self.stages[c] for c in self.tree.children_of(stage_id)]

    def final_stage_ids(self) -> set[int]:
        """Stages whose fragment holds a final aggregation — parallelism
        pinned to 1 (§4.1)."""
        from repro.engine.plan import FINAL_AGG, TOPN

        return {
            sid
            for sid, st in self.stages.items()
            if st.fragment.root.find(FINAL_AGG) or st.fragment.root.find(TOPN)
        }


def _needs_shuffle_buffer(exe: QueryExecution, stage_id: int) -> bool:
    """A stage needs a shuffle output buffer when its parent consumes it as
    the input of a partitioned operation (partitioned join side or an
    explicit shuffle stage)."""
    parent_id = exe.tree.parent_of(stage_id)
    if parent_id is None:
        return False
    pfrag = exe.tree[parent_id].root
    from repro.engine.plan import HASH_JOIN, SHUFFLE

    for join in pfrag.find(HASH_JOIN):
        if join.props.get("partitioned"):
            return True
    return bool(pfrag.find(SHUFFLE))


def _wire_parent(exe: QueryExecution, child: Stage, task: Task) -> None:
    """Give the new task's address to every parent-stage task (§4.4 step 2)
    and a buffer id to the child's output buffer for each parent task."""
    parent = exe.parent_stage(child.stage_id)
    if parent is None:
        return
    for ptask in parent.tasks:
        ptask.add_upstream(RemoteSplit(task.url, task.task_id))


def _wire_children(exe: QueryExecution, stage: Stage, task: Task) -> None:
    """Set child-stage task addresses on the new task (§4.4 step 3) and
    allocate it a buffer id in every child's output buffer."""
    for cstage in exe.child_stages(stage.stage_id):
        for ctask in cstage.tasks:
            task.add_upstream(RemoteSplit(ctask.url, ctask.task_id))
        buf = exe.out_buffers[cstage.stage_id]
        if isinstance(buf, ShuffleBuffer):
            if buf.shufflers:
                buf.shufflers[-1].add_id(task.seq)
            else:
                buf.new_group([task.seq])
        else:
            buf.add_buffer_id(task.seq)


def schedule_query(
    tree: StageTree,
    cluster: Cluster,
    *,
    stage_dop: int | dict[int, int] = 1,
    task_dop: int = 1,
    pinned_nodes: dict[int, list[str]] | None = None,
    rpc: RpcModel | None = None,
) -> QueryExecution:
    """Build the initial distributed execution plan (bottom-up, §4.4).

    ``stage_dop`` is either one DOP for every stage or a per-stage map
    (missing stages default to 1). ``pinned_nodes`` pins a stage's tasks
    to named nodes (scan stages co-located with their table's storage
    nodes); other stages are placed round-robin on compute nodes.
    Final-agg stages get DOP 1 (§4.1).
    """
    exe = QueryExecution(tree=tree, cluster=cluster, rpc=rpc or RpcModel())
    pinned_nodes = pinned_nodes or {}

    for sid in tree.topological():  # leaves first: bottom-up
        frag = tree[sid]
        stage = Stage(stage_id=sid, fragment=frag)
        exe.stages[sid] = stage
        exe.out_buffers[sid] = (
            ShuffleBuffer() if _needs_shuffle_buffer(exe, sid) else SharedBuffer()
        )
        n_tasks = stage_dop.get(sid, 1) if isinstance(stage_dop, dict) else stage_dop
        for node in cluster.place_tasks(n_tasks, pinned=pinned_nodes.get(sid)):
            task = stage.new_task(node.node_id)
            task.set_dop(task_dop)
            node.add_drivers(task.dop)
            _wire_children(exe, stage, task)
        # per task: create, pipeline setup, split assignment, up/down
        # address wiring, buffer registration, status, ack (8 round trips);
        # plus 2 stage-level status calls. Calibrated so a 6-stage DOP-1
        # plan (Q3) costs ~65 requests, as measured in §6.2.
        exe.charge_rpc(8 * n_tasks + 2)

    # Final stages: force DOP 1 after generic construction (§4.1).
    for sid in exe.final_stage_ids():
        stage = exe.stages[sid]
        while stage.dop > 1:
            t = stage.tasks[-1]
            exe.cluster.node(t.node_id).remove_drivers(t.dop)
            for cstage in exe.child_stages(sid):
                buf = exe.out_buffers[cstage.stage_id]
                if isinstance(buf, ShuffleBuffer):
                    for sh in buf.shufflers:
                        if t.seq in sh.buffer_ids:
                            sh.remove_id(t.seq)
                elif t.seq in buf.buffer_ids:
                    buf.remove_buffer_id(t.seq)
            stage.remove_task(t)
        for t in stage.tasks:
            if t.dop > 1:
                exe.cluster.node(t.node_id).remove_drivers(t.dop - 1)
        stage.set_task_dop(1)

    exe.charge_rpc(5)  # query-level coordinator round-trips
    exe.init_time_s = exe.control_time_s
    exe.init_rpc_requests = exe.rpc_requests
    return exe


@dataclass
class DynamicScheduler:
    """Runtime DOP tuning operations over a scheduled query (§4.3–4.4)."""

    exe: QueryExecution

    # ------------------------------------------------------- intra-task (§4.3)
    def set_task_dop(self, stage_id: int, n: int) -> float:
        """Change the driver count of every task in the stage. Returns the
        control-plane latency (the paper measures driver generation < 1 ms;
        the cost is the RESTful round trip per task)."""
        stage = self.exe.stages[stage_id]
        if stage_id in self.exe.final_stage_ids() and n != 1:
            raise ValueError(f"stage {stage_id} holds a final agg; task DOP pinned to 1")
        for task in stage.tasks:
            old = task.dop
            task.set_dop(n)
            node = self.exe.cluster.node(task.node_id)
            if n > old:
                node.add_drivers(n - old)
            else:
                node.remove_drivers(old - n)
        return self.exe.charge_rpc(len(stage.tasks))

    # ------------------------------------------------------ intra-stage (§4.4)
    def add_tasks(self, stage_id: int, n: int, *, pinned: list[str] | None = None) -> tuple[list[Task], float]:
        """§4.4 Increasing stage DOP: (1) generate new tasks, (2) hand their
        addresses to parent-stage tasks, (3) set child-stage addresses on
        them. Returns (new tasks, control latency)."""
        stage = self.exe.stages[stage_id]
        if stage_id in self.exe.final_stage_ids():
            raise ValueError(f"stage {stage_id} holds a final agg; stage DOP pinned to 1")
        task_dop = stage.task_dop or 1
        new_tasks: list[Task] = []
        for i in range(n):
            if pinned:
                node = self.exe.cluster.node(pinned[(stage.dop + i) % len(pinned)])
            else:
                node = self.exe.cluster.place_task()
            task = stage.new_task(node.node_id)
            task.set_dop(task_dop)
            node.add_drivers(task.dop)
            _wire_parent(self.exe, stage, task)
            _wire_children(self.exe, stage, task)
            new_tasks.append(task)
        # One batched creation request plus a per-task ack: the paper
        # measures ~23 ms average for a stage-DOP adjustment (§6.4.1) —
        # address wiring piggybacks on existing heartbeats.
        cost = self.exe.charge_rpc(2 + n)
        return new_tasks, cost

    def remove_tasks(self, stage_id: int, n: int) -> tuple[list[Task], float]:
        """§4.4 Decreasing stage DOP: end signals to the child stages'
        output buffers for the victims' buffer ids; end pages flow through
        the victims to the parents, which drop their RPC addresses."""
        stage = self.exe.stages[stage_id]
        victims = stage.tasks[-n:]
        for task in victims:
            for cstage in self.exe.child_stages(stage_id):
                buf = self.exe.out_buffers[cstage.stage_id]
                if isinstance(buf, ShuffleBuffer):
                    for sh in buf.shufflers:
                        if task.seq in sh.buffer_ids:
                            sh.remove_id(task.seq)
                else:
                    if task.seq in buf.buffer_ids:
                        buf.remove_buffer_id(task.seq)
            parent = self.exe.parent_stage(stage_id)
            if parent is not None:
                for ptask in parent.tasks:
                    ptask.drop_upstream_task(task.task_id)
            self.exe.cluster.node(task.node_id).remove_drivers(task.dop)
            stage.remove_task(task)
        cost = self.exe.charge_rpc(2 * n)
        return victims, cost
