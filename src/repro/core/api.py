"""Named entry points for the §4 CTP evaluation algorithms."""
from __future__ import annotations

from ..graph.model import LocalGraph
from .bft import BFTConfig, BFTSearch
from .engine import ALL_NODES, RootedSearch, SearchConfig, SearchOutcome
from .filters import CTPFilters

__all__ = [
    "ALL_NODES", "bft", "bft_m", "bft_am", "gam", "esp", "moesp", "lesp",
    "molesp", "ALGORITHMS",
]


def _rooted(
    g: LocalGraph, seed_sets: list, filters: CTPFilters, cfg: SearchConfig
) -> SearchOutcome:
    return RootedSearch(g, seed_sets, cfg, filters).run()


def bft(g, seed_sets, filters: CTPFilters = CTPFilters(), **_ignored) -> SearchOutcome:
    """§4.1 breadth-first baseline (complete; minimizes results)."""
    return BFTSearch(g, seed_sets, BFTConfig("none"), filters).run()


def bft_m(g, seed_sets, filters: CTPFilters = CTPFilters(), **_ignored) -> SearchOutcome:
    """§4.3 BFT with single-level Merge."""
    return BFTSearch(g, seed_sets, BFTConfig("once"), filters).run()


def bft_am(g, seed_sets, filters: CTPFilters = CTPFilters(), **_ignored) -> SearchOutcome:
    """§4.3 BFT with aggressive Merge."""
    return BFTSearch(g, seed_sets, BFTConfig("aggressive"), filters).run()


def gam(g, seed_sets, filters: CTPFilters = CTPFilters(), *, rng_seed=None,
        multi_queue=False, priority="size") -> SearchOutcome:
    """§4.2 Grow-and-Aggressive-Merge (complete; no edge-set pruning)."""
    return _rooted(g, seed_sets, filters,
                   SearchConfig(rng_seed=rng_seed, multi_queue=multi_queue, priority=priority))


def esp(g, seed_sets, filters: CTPFilters = CTPFilters(), *, rng_seed=None,
        multi_queue=False, priority="size") -> SearchOutcome:
    """§4.4 GAM + edge-set pruning (complete only for m <= 2)."""
    return _rooted(g, seed_sets, filters,
                   SearchConfig(esp=True, rng_seed=rng_seed, multi_queue=multi_queue,
                                priority=priority))


def moesp(g, seed_sets, filters: CTPFilters = CTPFilters(), *, rng_seed=None,
          multi_queue=False, priority="size") -> SearchOutcome:
    """§4.5 Merge-oriented ESP (finds all 2-piecewise-simple results)."""
    return _rooted(g, seed_sets, filters,
                   SearchConfig(esp=True, mo=True, rng_seed=rng_seed,
                                multi_queue=multi_queue, priority=priority))


def lesp(g, seed_sets, filters: CTPFilters = CTPFilters(), *, rng_seed=None,
         multi_queue=False, priority="size") -> SearchOutcome:
    """§4.6 Limited edge-set pruning (finds all (u,n)-rooted merges)."""
    return _rooted(g, seed_sets, filters,
                   SearchConfig(esp=True, lesp=True, rng_seed=rng_seed,
                                multi_queue=multi_queue, priority=priority))


def molesp(g, seed_sets, filters: CTPFilters = CTPFilters(), *, rng_seed=None,
           multi_queue=False, priority="size") -> SearchOutcome:
    """§4.7 MoLESP — complete for m <= 3 and for Property-9 results."""
    return _rooted(g, seed_sets, filters,
                   SearchConfig(esp=True, mo=True, lesp=True, rng_seed=rng_seed,
                                multi_queue=multi_queue, priority=priority))


ALGORITHMS = {
    "BFT": bft,
    "BFT-M": bft_m,
    "BFT-AM": bft_am,
    "GAM": gam,
    "ESP": esp,
    "MoESP": moesp,
    "LESP": lesp,
    "MoLESP": molesp,
}
