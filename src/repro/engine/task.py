"""Tasks — the smallest unit of distributed execution (§2).

A task lives on a worker node, owns the fragment's pipelines, spawns
drivers for them, and keeps a **task context** with its runtime counters
(Fig. 18's lowest level: fetched periodically by the coordinator's runtime
information collector). Each task also keeps the global remote split set
(§4.3) so new drivers can be wired to upstream tasks without the
coordinator.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.engine.pipeline import Pipeline, fragment_to_pipelines
from repro.engine.plan import Fragment
from repro.engine.splits import RemoteSplit, RemoteSplitSet


@dataclass
class TaskContext:
    """Runtime counters owned by the task, aggregated stage-/query-level by
    the collector (§5.1, Fig. 18)."""

    rows_processed: int = 0
    bytes_processed: float = 0.0
    #: turn-up counter of the task's exchange (input) buffer — §5.1.
    turn_up_counter: int = 0
    #: last measured processing rate, bytes/s.
    throughput_bytes_s: float = 0.0
    #: wall time spent building this task's hash table, if any (§5.2).
    hash_build_time_s: float = 0.0
    finished: bool = False


@dataclass
class Task:
    """One task of one stage, mapped to a compute node."""

    stage_id: int
    seq: int
    node_id: str
    fragment: Fragment
    pipelines: list[Pipeline] = field(default_factory=list)
    remote_splits: RemoteSplitSet = field(default_factory=RemoteSplitSet)
    context: TaskContext = field(default_factory=TaskContext)

    def __post_init__(self) -> None:
        if not self.pipelines:
            self.pipelines = fragment_to_pipelines(self.fragment)

    @property
    def task_id(self) -> str:
        """Paper naming: stage number + task sequence number (task3_2)."""
        return f"task{self.stage_id}_{self.seq}"

    @property
    def url(self) -> str:
        return f"http://{self.node_id}/{self.task_id}"

    # ------------------------------------------------------------- driver DOP
    def main_pipeline(self) -> Pipeline:
        """The pipeline whose driver count is the task DOP: the one doing
        the fragment's work (probe/scan), i.e. the output pipeline."""
        for p in self.pipelines:
            if p.is_output_pipeline():
                return p
        return self.pipelines[-1]

    @property
    def dop(self) -> int:
        return max(1, self.main_pipeline().dop)

    def set_dop(self, n: int) -> int:
        """Spawn or end-page-close drivers on the main pipeline; returns the
        resulting driver count."""
        p = self.main_pipeline()
        while p.dop < n:
            p.new_driver()
        while p.dop > n:
            p.remove_driver()
        return p.dop

    # ----------------------------------------------------------- split wiring
    def add_upstream(self, split: RemoteSplit) -> None:
        self.remote_splits.add(split)

    def drop_upstream_task(self, task_id: str) -> None:
        """§4.4 decreasing stage DOP: parents delete the closed task's RPC
        address after receiving its end pages."""
        self.remote_splits.remove_task(task_id)

    def upstream_addresses(self) -> list[RemoteSplit]:
        return self.remote_splits.addresses()
