"""Pages — the unit of data flow between operators, drivers, and tasks.

In Accordion (as in Presto/Velox) a data chunk is divided into pages
(sub-chunks) which flow through physical operators and between tasks over
RPC (§2). The reproduction models a page as a (rows, bytes) bundle plus an
optional pandas payload: the timing simulator moves count-only pages, the
Spark data plane moves pages that carry real data.

``END_PAGE`` is the §4.3 end page: a sentinel relayed operator-to-operator
("end page relay game") to shut down drivers and tasks gracefully, both at
normal completion and — Accordion's extension — mid-execution when DOP is
reduced.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any


@dataclass
class Page:
    """One page of data: row/byte counts and an optional real payload."""

    rows: int = 0
    bytes: int = 0
    payload: Any = None
    #: True only for the END_PAGE sentinel (and copies made by `end_page()`).
    is_end: bool = field(default=False, compare=True)

    def is_empty(self) -> bool:
        return self.rows == 0 and not self.is_end


def end_page() -> Page:
    """A fresh end-page sentinel (safe to enqueue into multiple buffers)."""
    return Page(rows=0, bytes=0, payload=None, is_end=True)


#: Shared immutable end page for identity checks in tests.
END_PAGE = end_page()

#: Default page size used when chunking byte volumes into pages (1 MB, the
#: order of magnitude of Presto's pages; buffers start at one-page capacity
#: per §4.2.2).
DEFAULT_PAGE_BYTES = 1_000_000


def paginate(total_bytes: float, rows: int, page_bytes: int = DEFAULT_PAGE_BYTES) -> list[Page]:
    """Split a byte volume into count-only pages of ``page_bytes`` each."""
    pages: list[Page] = []
    remaining = int(total_bytes)
    remaining_rows = rows
    while remaining > 0:
        b = min(page_bytes, remaining)
        r = min(remaining_rows, max(1, round(rows * b / max(1, int(total_bytes)))))
        pages.append(Page(rows=r, bytes=b))
        remaining -= b
        remaining_rows -= r
    if remaining_rows > 0 and pages:
        pages[-1].rows += remaining_rows
    return pages
