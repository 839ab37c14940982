"""Discrete-time executor over a scheduled query (the timing data plane).

This is the substrate on which every §6 experiment runs. It executes a
:class:`SimQuery` — a fragmented stage tree annotated with per-stage cost
parameters — over the simulated cluster, modelling exactly the quantities
the paper's evaluation depends on:

* streaming dataflow with elastic-buffer backpressure (§4.2.2) — pages are
  tracked as byte volumes; buffers grow when the consumer starves (turn-up
  counter -> §5.1 bottleneck localization) and resize every 500 ms;
* per-driver processing rates with CPU time-slicing on nodes (the §6.2
  saturation plateau) and per-task shuffle-executor caps (§6.4.2);
* join build/probe phasing: probe waits for hash-table construction
  (execution dependency), build-side output is retained in the
  intermediate data cache (§4.5);
* runtime DOP changes through the dynamic scheduler: driver changes take
  effect immediately; broadcast-join stage growth activates new tasks
  after a parallel full rebuild; partitioned-join stage changes perform
  DOP switching via a new task group (reshuffle + build, Table 2) while
  the old group keeps probing (Fig. 26).

The *object model* (stages/tasks/drivers/buffers in ``repro.engine``) is
kept consistent with the flow state at every step, so the control plane
(scheduler, tuner, filter) operates on real engine structures while the
byte-flow arithmetic stays cheap enough to simulate thousands of seconds
in milliseconds.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.cluster import Cluster, RpcModel, calibration as cal
from repro.engine.hashjoin import (
    IntermediateDataCache,
    RebuildOp,
    StateTransferRecord,
    plan_broadcast_rebuild,
    plan_partitioned_switch,
)
from repro.engine.pages import DEFAULT_PAGE_BYTES
from repro.engine.plan import HASH_JOIN, StageTree
from repro.engine.scheduler import DynamicScheduler, QueryExecution, schedule_query
from repro.engine.stage import Stage

_EPS = 1.0  # byte epsilon for "drained"


@dataclass
class StageCost:
    """Cost annotations for one stage (see cluster.calibration for units).

    ``selectivity`` is output-bytes per input-byte for the whole fragment
    (filters, projections, partial aggregation, join fan-out folded in).
    ``per_task_rate`` marks shuffle stages whose throughput scales with the
    task count (executor-bound), not the driver count.
    """

    per_driver_rate_mb_s: float
    selectivity: float = 1.0
    scan_bytes: float = 0.0
    scan_rows: int = 0
    out_shuffle_rate_mb_s: float | None = None
    per_task_rate: bool = False
    build_rate_mb_s: float = cal.BUILD_RATE_MB_S
    rebuild_shuffle_rate_mb_s: float = cal.REBUILD_SHUFFLE_RATE_MB_S


@dataclass
class SimQuery:
    """A fragmented plan plus cost annotations and scan placement."""

    name: str
    tree: StageTree
    costs: dict[int, StageCost]
    pinned_nodes: dict[int, list[str]] = field(default_factory=dict)
    #: per-stage initial DOP overriding the executor-level default (QSHUF
    #: starts its join at DOP 10 while its scans sit on 2 storage nodes).
    initial_stage_dop: dict[int, int] = field(default_factory=dict)

    def expected_input_bytes(self, sid: int) -> float:
        """Total bytes this stage will consume on its main (probe) input."""
        frag = self.tree[sid]
        cost = self.costs[sid]
        if frag.is_scan():
            return cost.scan_bytes
        probe = frag.probe_source()
        if probe is not None:
            return self.expected_output_bytes(probe.child_stage_id)
        return sum(
            self.expected_output_bytes(s.child_stage_id)
            for s in frag.sources
            if s.role == "input"
        )

    def expected_output_bytes(self, sid: int) -> float:
        return self.expected_input_bytes(sid) * self.costs[sid].selectivity

    def expected_build_bytes(self, sid: int) -> float:
        build = self.tree[sid].build_source()
        if build is None:
            return 0.0
        return self.expected_output_bytes(build.child_stage_id)


@dataclass
class ByteElasticBuffer:
    """Byte-volume equivalent of buffers.RuntimeElasticBuffer (§4.2.2).

    Same policy at page (1 MB) granularity: start at one page, grow by a
    page each time the consumer finds it empty (counting turn-ups), and
    periodically resize to the recent consumption volume.
    """

    capacity: float = float(DEFAULT_PAGE_BYTES)
    level: float = 0.0
    turn_up_counter: int = 0
    ended: bool = False
    consumed_since_resize: float = 0.0
    _last_resize: float = 0.0

    def free(self) -> float:
        return max(0.0, self.capacity - self.level)

    def push(self, nbytes: float) -> None:
        self.level += nbytes

    def take(self, want: float) -> float:
        """Consumer-side pull; starving (want > 0 on an empty, un-ended
        buffer) grows capacity and bumps the turn-up counter."""
        if want <= 0.0:
            return 0.0
        if self.level <= _EPS and not self.ended:
            self.turn_up_counter += 1
            self.capacity += DEFAULT_PAGE_BYTES
            got = self.level
        else:
            got = min(want, self.level)
        self.level -= got
        self.consumed_since_resize += got
        return got

    def tick(self, now: float) -> None:
        if now - self._last_resize < cal.BUFFER_RESIZE_INTERVAL_S:
            return
        self._last_resize = now
        self.capacity = max(float(DEFAULT_PAGE_BYTES), 1.2 * self.consumed_since_resize)
        self.consumed_since_resize = 0.0

    def drained(self) -> bool:
        return self.level <= _EPS


@dataclass
class TuningOutcome:
    """Result of a runtime DOP request at the executor level."""

    applied: bool
    reason: str = ""
    latency_s: float = 0.0
    rebuild: RebuildOp | None = None


@dataclass
class _StageState:
    stage: Stage
    cost: StageCost
    has_join: bool = False
    partitioned: bool = False
    is_scan: bool = False
    is_root: bool = False
    scan_remaining: float = 0.0
    in_buf: ByteElasticBuffer = field(default_factory=ByteElasticBuffer)
    build_buf: ByteElasticBuffer | None = None
    expected_in: float = 0.0
    expected_build: float = 0.0
    consumed: float = 0.0
    produced: float = 0.0
    build_received: float = 0.0
    built: bool = True
    build_done_at: float | None = None
    build_done_times: list[float] = field(default_factory=list)
    #: task_id -> simulated time at which the task may start probing.
    active_from: dict[str, float] = field(default_factory=dict)
    #: partitioned joins: the task group currently serving probes.
    probing_task_ids: list[str] | None = None
    pending_switch: RebuildOp | None = None
    pending_old_ids: list[str] = field(default_factory=list)
    ended: bool = False
    end_at: float | None = None
    window_consumed: float = 0.0
    shuffle_bound_ticks: int = 0
    cum_consumed_samples: list[tuple[float, float]] = field(default_factory=list)

    def effective_dop(self) -> int:
        if self.probing_task_ids is not None:
            return len(self.probing_task_ids)
        return self.stage.dop


class SimExecutor:
    """Runs one SimQuery to completion under runtime DOP control."""

    def __init__(
        self,
        query: SimQuery,
        *,
        cluster: Cluster | None = None,
        stage_dop: int = 1,
        task_dop: int = 1,
        rpc_seed: int = 0,
        dt: float = cal.SIM_DT_S,
    ) -> None:
        self.query = query
        self.cluster = cluster or Cluster.presto_testbed()
        self.dt = dt
        self.t = 0.0
        dops: int | dict[int, int] = stage_dop
        if query.initial_stage_dop:
            dops = {
                sid: query.initial_stage_dop.get(sid, stage_dop)
                for sid in query.tree.stage_ids()
            }
        self.exe: QueryExecution = schedule_query(
            query.tree,
            self.cluster,
            stage_dop=dops,
            task_dop=task_dop,
            pinned_nodes=query.pinned_nodes,
            rpc=RpcModel(seed=rpc_seed),
        )
        self.sched = DynamicScheduler(self.exe)
        self.cache = IntermediateDataCache()
        self.state_transfers: list[StateTransferRecord] = []
        #: every hash-table (re)construction triggered by DOP tuning.
        self.rebuild_log: list[RebuildOp] = []
        self.rejections: list[str] = []
        self.done = False
        self.total_time_s: float | None = None
        self._sample_every = 1.0
        self._last_sample = 0.0

        self.states: dict[int, _StageState] = {}
        for sid in query.tree.stage_ids():
            frag = query.tree[sid]
            st = _StageState(stage=self.exe.stages[sid], cost=query.costs[sid])
            st.is_scan = frag.is_scan()
            st.is_root = sid == query.tree.root_id
            st.has_join = frag.has_join()
            joins = frag.root.find(HASH_JOIN)
            if len(joins) > 1:
                raise ValueError("at most one join per fragment supported")
            st.partitioned = bool(joins and joins[0].props.get("partitioned"))
            if st.is_scan:
                st.scan_remaining = st.cost.scan_bytes
            if st.has_join:
                st.built = False
                st.build_buf = ByteElasticBuffer()
            st.expected_in = query.expected_input_bytes(sid)
            st.expected_build = query.expected_build_bytes(sid)
            if st.partitioned:
                st.probing_task_ids = [t.task_id for t in st.stage.tasks]
            self.states[sid] = st
        self._topo = query.tree.topological()
        #: parent edge: child sid -> (parent sid, role)
        self._parent_edge: dict[int, tuple[int, str]] = {}
        for sid in query.tree.stage_ids():
            for src in query.tree[sid].sources:
                self._parent_edge[src.child_stage_id] = (sid, src.role)

    # ------------------------------------------------------------------ flow
    def _cpu_scale(self, node_id: str) -> float:
        return self.cluster.node(node_id).cpu_scale()

    def _probing_tasks(self, st: _StageState):
        tasks = st.stage.tasks
        if st.probing_task_ids is not None:
            ids = set(st.probing_task_ids)
            tasks = [t for t in tasks if t.task_id in ids]
        return [
            t
            for t in tasks
            if st.active_from.get(t.task_id, 0.0) <= self.t
        ]

    def _capacity_bytes(self, st: _StageState) -> float:
        """Input-processing capacity of this stage for one tick."""
        if st.has_join and not st.built:
            return 0.0
        rate = cal.mb_s(st.cost.per_driver_rate_mb_s)
        if st.cost.per_task_rate:
            return len(self._probing_tasks(st)) * rate * self.dt
        total = 0.0
        for task in self._probing_tasks(st):
            total += task.dop * self._cpu_scale(task.node_id) * rate
        return total * self.dt

    def _out_cap_bytes(self, st: _StageState) -> float:
        if st.cost.out_shuffle_rate_mb_s is None:
            return float("inf")
        n = len(self._probing_tasks(st))
        return n * cal.mb_s(st.cost.out_shuffle_rate_mb_s) * self.dt

    def _push_downstream(self, sid: int, st: _StageState, nbytes: float) -> None:
        edge = self._parent_edge.get(sid)
        if edge is None:
            return
        psid, role = edge
        pst = self.states[psid]
        buf = pst.build_buf if role == "build" else pst.in_buf
        assert buf is not None
        buf.push(nbytes)

    def _downstream_free(self, sid: int) -> float:
        edge = self._parent_edge.get(sid)
        if edge is None:
            return float("inf")
        psid, role = edge
        pst = self.states[psid]
        buf = pst.build_buf if role == "build" else pst.in_buf
        assert buf is not None
        return buf.free()

    def _step_stage(self, sid: int) -> None:
        st = self.states[sid]
        if st.ended:
            return
        # ---- join build phase: ingest the build side ----------------------
        if st.has_join and not st.built:
            n_tasks = max(1, len(st.stage.tasks))
            want = n_tasks * cal.mb_s(st.cost.build_rate_mb_s) * self.dt
            assert st.build_buf is not None
            got = st.build_buf.take(want)
            st.build_received += got
            if st.build_buf.ended and st.build_buf.drained():
                st.built = True
                st.build_done_at = self.t
                st.build_done_times.append(self.t)
                for task in st.stage.tasks:
                    task.context.hash_build_time_s = self.t
                # §4.5: build side cached for later reconstructions.
                build_src = self.query.tree[sid].build_source()
                if build_src is not None:
                    self.cache.put(build_src.child_stage_id, st.build_received)
        # ---- main (probe) flow -------------------------------------------
        capacity = self._capacity_bytes(st)
        sel = st.cost.selectivity
        limit = capacity
        free = self._downstream_free(sid)
        if sel > 0 and free < float("inf"):
            limit = min(limit, free / sel)
        out_cap = self._out_cap_bytes(st)
        shuffle_bound = False
        if sel > 0 and out_cap < float("inf"):
            if out_cap / sel < limit:
                shuffle_bound = True
            limit = min(limit, out_cap / sel)
        if st.is_scan:
            got = min(limit, st.scan_remaining)
            st.scan_remaining -= got
        else:
            got = st.in_buf.take(limit)
        if shuffle_bound and got > 0:
            st.shuffle_bound_ticks += 1
        st.consumed += got
        st.window_consumed += got
        out = got * sel
        st.produced += out
        self._push_downstream(sid, st, out)
        # ---- end detection ------------------------------------------------
        input_done = (
            (st.scan_remaining <= _EPS)
            if st.is_scan
            else (st.in_buf.ended and st.in_buf.drained())
        )
        if input_done and st.built:
            st.ended = True
            st.end_at = self.t
            # A switch still in flight when the probe finishes is moot —
            # the filter should have rejected it (§5.2); drop it.
            st.pending_switch = None
            st.pending_old_ids = []
            self._mark_edge_ended(sid)
            for task in st.stage.tasks:
                task.context.finished = True

    def _mark_edge_ended(self, sid: int) -> None:
        """Propagate end pages upward: the parent's buffer for this edge is
        marked ended once every sibling feeding the same buffer has ended."""
        edge = self._parent_edge.get(sid)
        if edge is None:
            return
        psid, role = edge
        pst = self.states[psid]
        siblings = [
            s.child_stage_id
            for s in self.query.tree[psid].sources
            if (s.role == "build") == (role == "build")
        ]
        if all(self.states[s].ended for s in siblings):
            buf = pst.build_buf if role == "build" else pst.in_buf
            assert buf is not None
            buf.ended = True

    def _process_pending(self) -> None:
        for sid, st in self.states.items():
            op = st.pending_switch
            if op is not None and self.t >= op.done_at:
                # switch the probe side to the new task group (§4.5)
                st.probing_task_ids = list(op.new_task_ids)
                old = [t for t in st.stage.tasks if t.task_id in set(st.pending_old_ids)]
                for task in old:
                    self.cluster.node(task.node_id).remove_drivers(task.dop)
                    st.stage.remove_task(task)
                self.state_transfers.append(op.record())
                st.pending_switch = None
                st.pending_old_ids = []
                st.build_done_times.append(op.done_at)

    # ------------------------------------------------------------------ step
    def step(self) -> None:
        if self.done:
            return
        self.t += self.dt
        self._process_pending()
        for sid in self._topo:
            self._step_stage(sid)
        for st in self.states.values():
            st.in_buf.tick(self.t)
            if st.build_buf is not None:
                st.build_buf.tick(self.t)
        if self.t - self._last_sample >= self._sample_every:
            span = self.t - self._last_sample
            for sid, st in self.states.items():
                st.stage.throughput.record(self.t, st.window_consumed / span)
                st.cum_consumed_samples.append((self.t, st.consumed))
                st.window_consumed = 0.0
            self._last_sample = self.t
        root = self.states[self.query.tree.root_id]
        if root.ended:
            self.done = True
            self.total_time_s = self.t + self.exe.init_time_s

    def run(self, *, controllers=(), max_s: float = 1e7) -> float:
        """Run to completion; ``controllers`` are callables (t, executor)
        invoked every tick (script executor, auto-tuner)."""
        while not self.done and self.t < max_s:
            for c in controllers:
                c(self.t, self)
            self.step()
        if not self.done:
            raise RuntimeError(f"query {self.query.name} did not finish by {max_s}s")
        return self.total_time_s  # type: ignore[return-value]

    # --------------------------------------------------------- DOP interface
    def set_task_dop(self, stage_id: int, n: int) -> TuningOutcome:
        """Intra-task runtime DOP tuning (§4.3)."""
        st = self.states[stage_id]
        if st.ended:
            return TuningOutcome(False, "stage already finished")
        try:
            latency = self.sched.set_task_dop(stage_id, n)
        except ValueError as exc:
            return TuningOutcome(False, str(exc))
        return TuningOutcome(True, latency_s=latency)

    def set_stage_dop(self, stage_id: int, n: int) -> TuningOutcome:
        """Intra-stage runtime DOP tuning (§4.4), with §4.5 hash-join
        semantics when the stage holds a join."""
        st = self.states[stage_id]
        if st.ended:
            return TuningOutcome(False, "stage already finished")
        cur = st.effective_dop()
        if n == cur:
            return TuningOutcome(False, "no-op: requested current DOP")
        if not st.has_join:
            try:
                if n > cur:
                    _, latency = self.sched.add_tasks(stage_id, n - cur)
                else:
                    _, latency = self.sched.remove_tasks(stage_id, cur - n)
            except ValueError as exc:
                return TuningOutcome(False, str(exc))
            return TuningOutcome(True, latency_s=latency)
        # --- join stages ---------------------------------------------------
        build_bytes = st.expected_build
        if st.partitioned:
            if st.pending_switch is not None:
                return TuningOutcome(False, "DOP switch already in progress")
            old_ids = list(st.probing_task_ids or [])
            new_tasks, latency = self.sched.add_tasks(stage_id, n)
            op = plan_partitioned_switch(
                stage_id=stage_id,
                old_dop=cur,
                new_dop=n,
                build_bytes=build_bytes,
                now_s=self.t,
                rebuild_shuffle_rate_mb_s=st.cost.rebuild_shuffle_rate_mb_s,
                build_rate_mb_s=st.cost.build_rate_mb_s,
            )
            op.new_task_ids = [t.task_id for t in new_tasks]
            op.from_cache = True
            self.rebuild_log.append(op)
            st.pending_switch = op
            st.pending_old_ids = old_ids
            for t in new_tasks:
                st.active_from[t.task_id] = op.done_at
            return TuningOutcome(True, latency_s=latency, rebuild=op)
        # broadcast join
        if n > cur:
            new_tasks, latency = self.sched.add_tasks(stage_id, n - cur)
            op = plan_broadcast_rebuild(
                stage_id=stage_id,
                old_dop=cur,
                new_dop=n,
                build_bytes=build_bytes,
                now_s=self.t,
                build_rate_mb_s=st.cost.build_rate_mb_s,
            )
            op.new_task_ids = [t.task_id for t in new_tasks]
            self.rebuild_log.append(op)
            for t in new_tasks:
                st.active_from[t.task_id] = op.done_at
            st.build_done_times.append(op.done_at)
            return TuningOutcome(True, latency_s=latency, rebuild=op)
        _, latency = self.sched.remove_tasks(stage_id, cur - n)
        return TuningOutcome(True, latency_s=latency)

    # ------------------------------------------------------- runtime queries
    def scan_progress(self, stage_id: int) -> tuple[float, float]:
        """(V_remain bytes, R_consume bytes/s over ~5 s) for a scan stage —
        the §5.2 progress signal."""
        st = self.states[stage_id]
        remaining = st.scan_remaining if st.is_scan else max(0.0, st.expected_in - st.consumed)
        samples = st.cum_consumed_samples
        if len(samples) >= 2:
            recent = [s for s in samples if s[0] >= self.t - 5.0]
            if len(recent) >= 2:
                (t0, c0), (t1, c1) = recent[0], recent[-1]
            else:
                (t0, c0), (t1, c1) = samples[-2], samples[-1]
            rate = (c1 - c0) / max(1e-9, t1 - t0)
        else:
            rate = st.consumed / max(1e-9, self.t)
        return remaining, rate

    def stage_finished(self, stage_id: int) -> bool:
        return self.states[stage_id].ended

    def stage_cpu_utilization(self, stage_id: int) -> float:
        st = self.states[stage_id]
        nodes = {t.node_id for t in st.stage.tasks}
        if not nodes:
            return 0.0
        return max(self.cluster.node(nid).cpu_utilization() for nid in nodes)

    def turn_up_counters(self) -> dict[int, int]:
        return {sid: st.in_buf.turn_up_counter for sid, st in self.states.items()}

    def estimated_build_bytes(self, stage_id: int) -> float:
        return self.states[stage_id].expected_build

    def stage_input_capacity_bytes_s(self, stage_id: int) -> float:
        """What the stage could consume per second with its current tasks
        and drivers at full CPU speed — the peak the probe side can reach
        without adding upstream resources (§5.3's n_f bound)."""
        st = self.states[stage_id]
        rate = cal.mb_s(st.cost.per_driver_rate_mb_s)
        if st.cost.per_task_rate:
            return len(self._probing_tasks(st) or st.stage.tasks) * rate
        tasks = self._probing_tasks(st) or st.stage.tasks
        total = 0.0
        for task in tasks:
            total += task.dop * self._cpu_scale(task.node_id) * rate
        return total

    def stage_output_capacity_bytes_s(self, stage_id: int) -> float:
        st = self.states[stage_id]
        cap = self.stage_input_capacity_bytes_s(stage_id) * st.cost.selectivity
        if st.cost.out_shuffle_rate_mb_s is not None:
            n = len(self._probing_tasks(st) or st.stage.tasks)
            cap = min(cap, n * cal.mb_s(st.cost.out_shuffle_rate_mb_s))
        return cap

    def stage_recent_output_rate_bytes_s(self, stage_id: int) -> float:
        _, rate = self.scan_progress(stage_id)
        return rate * self.states[stage_id].cost.selectivity
