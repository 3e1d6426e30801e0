"""Result and statistics containers shared by the search algorithms."""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from repro.core.pattern import Pattern


class SearchTimeout(Exception):
    """Raised when a search exceeds its wall-clock deadline (the paper uses
    a 10-minute timeout in the attribute-count sweeps; we use the same
    mechanism with a configurable budget)."""


@dataclass
class SearchStats:
    """Counters of search effort.

    ``examined`` counts every pattern whose bounds are evaluated — a pop in
    Algorithm 1, a re-evaluation or expansion in the incremental algorithms.
    This is the paper's "number of patterns examined during the search"
    metric behind the 29–57% reported gains.
    """

    examined: int = 0
    deadline: float | None = None  # time.monotonic() value, or None

    def check_deadline(self) -> None:
        if self.deadline is not None and time.monotonic() > self.deadline:
            raise SearchTimeout(f"examined={self.examined}")


@dataclass
class SearchResult:
    """Output of a detection algorithm: the most general biased patterns per
    k (``res[k]``), plus effort statistics."""

    res: dict[int, frozenset[Pattern]]
    stats: SearchStats = field(default_factory=SearchStats)
