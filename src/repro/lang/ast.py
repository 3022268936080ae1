"""EQL abstract syntax (§2): predicates, edge patterns, BGPs, CTPs, queries.

A predicate (Def. 2.2) is a conjunction of conditions ``p(v) op c`` over a
single variable, where ``p`` is a property (here: ``label`` for nodes and
edges, ``type`` for nodes) and ``op`` in {=, <, <=, ~} (``~`` is SQL LIKE
with ``*`` wildcards). The Def. 2.2 shorthand — a bare constant meaning
``label(v) = c`` — is supported via :func:`const`.
"""
from __future__ import annotations

import fnmatch
import itertools
from dataclasses import dataclass, field, replace

_autovar = itertools.count()


def _fresh() -> str:
    return f"_v{next(_autovar)}"


@dataclass(frozen=True)
class Cond:
    """One condition ``prop(v) op value``."""

    prop: str          # "label" | "type"
    op: str            # "=" | "<" | "<=" | "~"
    value: str

    def matches(self, label: str, types: frozenset[str]) -> bool:
        if self.prop == "label":
            lhs_values = [label]
        elif self.prop == "type":
            lhs_values = sorted(types)
        else:
            raise ValueError(f"unknown property {self.prop!r}")
        for lhs in lhs_values:
            if self.op == "=" and lhs == self.value:
                return True
            if self.op == "<" and lhs < self.value:
                return True
            if self.op == "<=" and lhs <= self.value:
                return True
            if self.op == "~" and fnmatch.fnmatchcase(lhs, self.value):
                return True
        return False


@dataclass(frozen=True)
class Pred:
    """A predicate over one variable (possibly with zero conditions)."""

    var: str
    conds: tuple[Cond, ...] = ()

    @property
    def is_empty(self) -> bool:
        return not self.conds


def var(name: str) -> Pred:
    return Pred(name)


def const(label: str, v: str | None = None) -> Pred:
    """The Def. 2.2 shorthand: a constant denotes label(v) = constant."""
    return Pred(v or _fresh(), (Cond("label", "=", label),))


def typed(type_name: str, v: str | None = None, **conds) -> Pred:
    cs = [Cond("type", "=", type_name)]
    for prop, value in conds.items():
        cs.append(Cond(prop, "=", value))
    return Pred(v or _fresh(), tuple(cs))


@dataclass(frozen=True)
class EdgePattern:
    """(p1, p2, p3): predicates over source node, edge, target node."""

    s: Pred
    e: Pred
    d: Pred


@dataclass(frozen=True)
class BGP:
    """A connected set of edge patterns (Def. 2.4)."""

    patterns: tuple[EdgePattern, ...]

    def __post_init__(self) -> None:
        if not self.patterns:
            raise ValueError("BGP needs at least one edge pattern")
        if len(self.patterns) > 1:
            # Connectivity check: every pattern shares a variable with
            # another pattern (Def. 2.4).
            def vars_of(p: EdgePattern) -> set[str]:
                return {p.s.var, p.e.var, p.d.var}

            groups = [vars_of(p) for p in self.patterns]
            merged = [groups[0]]
            rest = groups[1:]
            progress = True
            while rest and progress:
                progress = False
                for g in list(rest):
                    if any(g & m for m in merged):
                        merged[0] |= g
                        rest.remove(g)
                        progress = True
            if rest:
                raise ValueError("BGP edge patterns are not connected")

    def variables(self) -> list[str]:
        out: list[str] = []
        for p in self.patterns:
            for pred in (p.s, p.e, p.d):
                if pred.var not in out:
                    out.append(pred.var)
        return out

    def node_vars(self) -> list[str]:
        out: list[str] = []
        for p in self.patterns:
            for pred in (p.s, p.d):
                if pred.var not in out:
                    out.append(pred.var)
        return out


@dataclass(frozen=True)
class CTPFilterSpec:
    """Parsed filter clause of a CTP (§2 'CTP filters')."""

    uni: bool = False
    labels: frozenset[str] | None = None
    max_edges: int | None = None
    top_k: int | None = None
    limit: int | None = None
    score: str | None = None      # name resolved by the engine
    timeout_s: float | None = None


@dataclass(frozen=True)
class CTP:
    """(g_1, .., g_m, tree_var): the tree_var is the underlined variable."""

    preds: tuple[Pred, ...]
    tree_var: str
    filters: CTPFilterSpec = CTPFilterSpec()

    def __post_init__(self) -> None:
        if len(self.preds) < 2:
            raise ValueError("CTP needs m >= 2 seed predicates")
        names = [p.var for p in self.preds] + [self.tree_var]
        if len(set(names)) != len(names):
            raise ValueError("CTP variables must be pairwise distinct")

    @property
    def m(self) -> int:
        return len(self.preds)


@dataclass(frozen=True)
class Query:
    """A core query (Def. 2.6): head variables, BGPs and CTPs."""

    head: tuple[str, ...]
    bgps: tuple[BGP, ...] = ()
    ctps: tuple[CTP, ...] = ()

    def __post_init__(self) -> None:
        if not self.bgps and not self.ctps:
            raise ValueError("query body must contain at least one pattern")
        tree_vars = [c.tree_var for c in self.ctps]
        if len(set(tree_vars)) != len(tree_vars):
            raise ValueError("each CTP tree variable must appear exactly once")
        body = set(self.simple_variables()) | set(tree_vars)
        for h in self.head:
            if h not in body:
                raise ValueError(f"head variable {h!r} not in body")

    def simple_variables(self) -> list[str]:
        out: list[str] = []
        for b in self.bgps:
            for v in b.variables():
                if v not in out:
                    out.append(v)
        for c in self.ctps:
            for p in c.preds:
                if p.var not in out:
                    out.append(p.var)
        return out
