"""Physical operators: lifecycle, statefulness, and the end-page relay.

§4.1 classifies operators: **stateless** (filter, project, sink, source,
exchange, task output, table scan, shuffle) can have their DOP changed
freely; **stateful** (final aggregation, hash-join build) pin parallelism.
Partial aggregation is treated as stateless because its state can be
destroyed and rebuilt (two-phase aggregation model).

Each operator is in one of three states — unfinished, finishing, finished
(§2 "Driver Execution"). On receiving the end page a stateless operator
finishes immediately and relays it; a stateful operator first flushes its
buffered results (finishing), then relays (§4.3 Fig. 13, the "end page
relay game").
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.engine.pages import Page, end_page

UNFINISHED = "unfinished"
FINISHING = "finishing"
FINISHED = "finished"

#: §4.1: operator kinds whose DOP may be tuned freely.
STATELESS_KINDS = {
    "filter", "project", "sink", "source", "exchange", "task_output",
    "table_scan", "partial_agg", "shuffle", "probe", "topn_partial",
}
#: §4.1: operator kinds that pin the parallelism of their task/stage.
STATEFUL_KINDS = {"final_agg", "build", "cross_join_build", "topn"}


def is_stateless(kind: str) -> bool:
    if kind in STATELESS_KINDS:
        return True
    if kind in STATEFUL_KINDS:
        return False
    raise ValueError(f"unclassified operator kind: {kind}")


@dataclass
class Operator:
    """A physical operator processing pages.

    ``selectivity`` scales row/byte counts (filters, probes); stateful
    operators buffer their output volume and only release it while
    finishing, which is what makes the end-page relay non-trivial.
    """

    kind: str
    selectivity: float = 1.0
    state: str = UNFINISHED
    rows_in: int = 0
    bytes_in: int = 0
    rows_out: int = 0
    bytes_out: int = 0
    #: stateful operators accumulate here until flushed.
    _held: list[Page] = field(default_factory=list, repr=False)

    @property
    def stateless(self) -> bool:
        return is_stateless(self.kind)

    def process(self, page: Page) -> list[Page]:
        """Feed one page in; return pages to pass downstream."""
        if self.state == FINISHED:
            raise RuntimeError(f"{self.kind} operator received page after finish")
        if page.is_end:
            return self._finish()
        self.rows_in += page.rows
        self.bytes_in += page.bytes
        out = Page(
            rows=int(page.rows * self.selectivity),
            bytes=int(page.bytes * self.selectivity),
            payload=page.payload,
        )
        if self.stateless:
            self.rows_out += out.rows
            self.bytes_out += out.bytes
            return [out] if not out.is_empty() else []
        self._held.append(out)
        return []

    def _finish(self) -> list[Page]:
        if self.stateless:
            # Fig. 13: stateless -> finished immediately, relay end page.
            self.state = FINISHED
            return [end_page()]
        # Stateful: output all results first (finishing), then finish.
        self.state = FINISHING
        flushed = [p for p in self._held if not p.is_empty()]
        for p in flushed:
            self.rows_out += p.rows
            self.bytes_out += p.bytes
        self._held.clear()
        self.state = FINISHED
        return flushed + [end_page()]


@dataclass
class OperatorFactory:
    """Pipelines are sequences of operator *factories*, each able to
    produce one physical operator per driver (§2: pipeline is to driver as
    class is to object)."""

    kind: str
    selectivity: float = 1.0
    created: int = 0

    def create(self) -> Operator:
        self.created += 1
        return Operator(kind=self.kind, selectivity=self.selectivity)
