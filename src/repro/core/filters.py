"""CTP filters (§2, pushed into evaluation per §4.8).

All filters are optional and orthogonal; ``max_built`` is an
implementation-level deterministic budget (a step counter standing in for
wall-clock timeouts in tests, where timing would be flaky)."""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, TYPE_CHECKING

if TYPE_CHECKING:  # pragma: no cover
    from ..graph.model import LocalGraph
    from .tree import ResultTree

ScoreFn = Callable[["ResultTree", "LocalGraph"], float]


@dataclass(frozen=True)
class CTPFilters:
    """Filters attached to one CTP.

    uni        only trees with a root having directed paths to every seed
    labels     allowed edge labels (None = all)
    max_edges  MAX n — trees of at most n edges
    limit      stop the search after this many results (LIMIT)
    score      SCORE sigma — scores attached to every result
    top_k      TOP k — keep only the k best-scoring results
    timeout_s  per-CTP wall-clock timeout T
    max_built  deterministic budget on provenances built (testing aid)
    """

    uni: bool = False
    labels: frozenset[str] | None = None
    max_edges: int | None = None
    limit: int | None = None
    score: ScoreFn | None = None
    top_k: int | None = None
    timeout_s: float | None = None
    max_built: int | None = None

    def with_(self, **kw) -> "CTPFilters":
        from dataclasses import replace

        if "labels" in kw and kw["labels"] is not None:
            kw["labels"] = frozenset(kw["labels"])
        return replace(self, **kw)
