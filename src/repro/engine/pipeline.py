"""Fragment -> pipelines -> drivers (§2, Fig. 6).

A fragment cannot execute directly in a task: it is first rewritten (an
output node is appended), then cut at **pipeline breakers** — every local
exchange becomes a sink/source pair, every hash join a probe/build pair.
The result is an ordered collection of pipelines; each pipeline is a
sequence of operator factories and can instantiate any number of
**drivers** (the smallest unit of scheduling, §2). Intra-task DOP tuning
(§4.3) is precisely changing the driver count of a pipeline.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.engine import plan as P
from repro.engine.operators import Operator, OperatorFactory
from repro.engine.pages import Page


@dataclass
class Driver:
    """A physical operator sequence executed by one thread."""

    driver_id: int
    operators: list[Operator]

    def push(self, page: Page) -> list[Page]:
        """Run one page through the operator chain; returns emitted pages."""
        pages = [page]
        for op in self.operators:
            nxt: list[Page] = []
            for p in pages:
                nxt.extend(op.process(p))
            pages = nxt
            if not pages:
                break
        return pages

    def finished(self) -> bool:
        return all(op.state == "finished" for op in self.operators)


@dataclass
class Pipeline:
    """An ordered sequence of operator factories."""

    pipeline_id: int
    factories: list[OperatorFactory]
    drivers: list[Driver] = field(default_factory=list)
    _next_driver_id: int = 0

    def kinds(self) -> list[str]:
        return [f.kind for f in self.factories]

    @property
    def dop(self) -> int:
        return len(self.drivers)

    def new_driver(self) -> Driver:
        d = Driver(self._next_driver_id, [f.create() for f in self.factories])
        self._next_driver_id += 1
        self.drivers.append(d)
        return d

    def remove_driver(self) -> Driver | None:
        """Close one driver via the end-page relay; returns it, or None."""
        if not self.drivers:
            return None
        d = self.drivers.pop()
        d.push(Page(is_end=True))
        return d

    def contains(self, kind: str) -> bool:
        return kind in self.kinds()

    def is_exchange_pipeline(self) -> bool:
        return self.contains("exchange")

    def is_source_pipeline(self) -> bool:
        return self.contains("source")

    def is_output_pipeline(self) -> bool:
        return self.contains("task_output")


#: plan-node kind -> operator kind for nodes that map 1:1.
_DIRECT = {
    P.TABLE_SCAN: "table_scan",
    P.FILTER: "filter",
    P.PROJECT: "project",
    P.PARTIAL_AGG: "partial_agg",
    P.FINAL_AGG: "final_agg",
    P.TOPN: "topn",
    P.REMOTE_SOURCE: "exchange",
    P.SHUFFLE: "shuffle",
}


def fragment_to_pipelines(frag: P.Fragment) -> list[Pipeline]:
    """Rewrite a fragment and cut it into pipelines (Fig. 6).

    The fragment root gains a task-output operator (the rewrite's "output
    node"); each local exchange splits into sink (upstream pipeline tail) /
    source (downstream pipeline head); each hash join splits into a build
    pipeline (build side -> build operator) and leaves a probe operator in
    the containing pipeline.
    """
    pipelines: list[list[OperatorFactory]] = []

    def emit(ops: list[OperatorFactory]) -> None:
        pipelines.append(ops)

    def walk(node: P.PlanNode) -> list[OperatorFactory]:
        """Returns the operator chain of the pipeline containing ``node``,
        upstream-first; emits completed side pipelines along the way."""
        if node.kind == P.LOCAL_EXCHANGE:
            upstream = walk(node.children[0])
            emit(upstream + [OperatorFactory("sink")])
            return [OperatorFactory("source")]
        if node.kind in (P.HASH_JOIN, P.CROSS_JOIN):
            build_kind = "build" if node.kind == P.HASH_JOIN else "cross_join_build"
            build_chain = walk(node.children[1])
            emit(build_chain + [OperatorFactory(build_kind)])
            probe_chain = walk(node.children[0])
            sel = float(node.props.get("out_ratio", 1.0))
            return probe_chain + [OperatorFactory("probe", selectivity=sel)]
        if node.kind == P.OUTPUT:
            return walk(node.children[0])
        if node.kind in _DIRECT:
            sel = float(node.props.get("selectivity", 1.0))
            chain = walk(node.children[0]) if node.children else []
            return chain + [OperatorFactory(_DIRECT[node.kind], selectivity=sel)]
        raise ValueError(f"cannot lower plan node kind {node.kind}")

    main = walk(frag.root)
    emit(main + [OperatorFactory("task_output")])
    return [Pipeline(pid, facs) for pid, facs in enumerate(pipelines)]
