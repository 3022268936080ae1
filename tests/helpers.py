"""Shared test helpers."""
from __future__ import annotations

from repro.core.tree import ResultTree


def keys(results) -> set:
    """Canonical identity of a result collection: {(edges, seeds)}."""
    if hasattr(results, "results"):
        results = results.results
    return {(r.edges, r.seeds) for r in results}


def edge_sets(results) -> set[frozenset[int]]:
    if hasattr(results, "results"):
        results = results.results
    return {r.edges for r in results}


def singleton_sets(*nodes: int) -> list[list[int]]:
    return [[n] for n in nodes]
