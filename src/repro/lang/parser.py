"""Text surface syntax for EQL — a small parser so queries can be written
the way the paper writes them (datalog-style bodies with CTPs).

Grammar (whitespace/newline insensitive)::

    query   := SELECT var (, var)* WHERE clause (AND clause)*
    clause  := '(' pred ',' pred ',' pred ')'                 -- edge pattern
             | CTP '(' pred (',' pred)+ ',' '*'var ')' filter*
    filter  := UNI | LABEL '{' name (',' name)* '}' | MAX int
             | TOP int | LIMIT int | TIMEOUT float | SCORE name
    pred    := '"' constant '"'                               -- label(v)=c
             | var
             | var '{' cond (',' cond)* '}'
    cond    := prop op '"' value '"'    with prop in {label, type},
                                        op in {=, ~, <, <=}

The underlined CTP tree variable is written ``*w``. Consecutive edge
patterns that share variables are grouped into maximal connected BGPs
(Def. 2.4), mirroring how the paper draws query bodies.
"""
from __future__ import annotations

import re

from .ast import BGP, CTP, Cond, CTPFilterSpec, EdgePattern, Pred, Query

_TOKEN = re.compile(
    r"""
    (?P<str>"[^"]*")
  | (?P<num>\d+(?:\.\d+)?)
  | (?P<name>[A-Za-z_][A-Za-z_0-9]*)
  | (?P<op><=|=|~|<)
  | (?P<punct>[(){},*])
  | (?P<ws>\s+)
    """,
    re.VERBOSE,
)

_KEYWORDS = {"SELECT", "WHERE", "AND", "CTP", "UNI", "LABEL", "MAX", "TOP",
             "LIMIT", "TIMEOUT", "SCORE"}


class ParseError(ValueError):
    pass


class _Tokens:
    def __init__(self, text: str) -> None:
        self.toks: list[tuple[str, str]] = []
        pos = 0
        while pos < len(text):
            m = _TOKEN.match(text, pos)
            if not m:
                raise ParseError(f"cannot tokenize at: {text[pos:pos+20]!r}")
            pos = m.end()
            kind = m.lastgroup
            if kind != "ws":
                self.toks.append((kind, m.group()))
        self.i = 0

    def peek(self) -> tuple[str, str] | None:
        return self.toks[self.i] if self.i < len(self.toks) else None

    def next(self) -> tuple[str, str]:
        t = self.peek()
        if t is None:
            raise ParseError("unexpected end of query")
        self.i += 1
        return t

    def expect(self, value: str) -> None:
        k, v = self.next()
        if v.upper() != value and v != value:
            raise ParseError(f"expected {value!r}, got {v!r}")

    def at_keyword(self, kw: str) -> bool:
        t = self.peek()
        return t is not None and t[0] == "name" and t[1].upper() == kw


def _parse_pred(ts: _Tokens) -> Pred:
    kind, v = ts.next()
    if kind == "str":
        return Pred(_fresh_const_var(), (Cond("label", "=", v[1:-1]),))
    if kind != "name":
        raise ParseError(f"expected predicate, got {v!r}")
    varname = v
    t = ts.peek()
    if t is not None and t[1] == "{":
        ts.next()
        conds = []
        while True:
            _, prop = ts.next()
            if prop not in ("label", "type"):
                raise ParseError(f"unknown property {prop!r}")
            _, op = ts.next()
            if op not in ("=", "~", "<", "<="):
                raise ParseError(f"unknown operator {op!r}")
            k2, val = ts.next()
            if k2 != "str":
                raise ParseError(f"condition value must be quoted: {val!r}")
            conds.append(Cond(prop, op, val[1:-1]))
            k3, sep = ts.next()
            if sep == "}":
                break
            if sep != ",":
                raise ParseError(f"expected , or }} in conditions, got {sep!r}")
        return Pred(varname, tuple(conds))
    return Pred(varname)


_const_counter = [0]


def _fresh_const_var() -> str:
    _const_counter[0] += 1
    return f"_c{_const_counter[0]}"


def _parse_ctp_filters(ts: _Tokens) -> CTPFilterSpec:
    spec: dict = {}
    while True:
        t = ts.peek()
        if t is None or t[0] != "name" or t[1].upper() not in _KEYWORDS - {
            "SELECT", "WHERE", "CTP"
        }:
            break
        kw = ts.next()[1].upper()
        if kw == "AND":
            ts.i -= 1
            break
        if kw == "UNI":
            spec["uni"] = True
        elif kw == "LABEL":
            ts.expect("{")
            labels = []
            while True:
                k, v = ts.next()
                if k == "str":
                    labels.append(v[1:-1])
                elif k == "name":
                    labels.append(v)
                else:
                    raise ParseError(f"bad label {v!r}")
                _, sep = ts.next()
                if sep == "}":
                    break
                if sep != ",":
                    raise ParseError(f"expected , or }} in LABEL, got {sep!r}")
            spec["labels"] = frozenset(labels)
        elif kw == "MAX":
            spec["max_edges"] = int(ts.next()[1])
        elif kw == "TOP":
            spec["top_k"] = int(ts.next()[1])
        elif kw == "LIMIT":
            spec["limit"] = int(ts.next()[1])
        elif kw == "TIMEOUT":
            spec["timeout_s"] = float(ts.next()[1])
        elif kw == "SCORE":
            spec["score"] = ts.next()[1]
    return CTPFilterSpec(**spec)


def parse(text: str) -> Query:
    ts = _Tokens(text)
    ts.expect("SELECT")
    head = []
    while True:
        k, v = ts.next()
        if k != "name":
            raise ParseError(f"bad head variable {v!r}")
        head.append(v)
        t = ts.peek()
        if t is not None and t[1] == ",":
            ts.next()
            continue
        break
    ts.expect("WHERE")
    edge_patterns: list[EdgePattern] = []
    ctps: list[CTP] = []
    while True:
        if ts.at_keyword("CTP"):
            ts.next()
            ts.expect("(")
            preds: list[Pred] = []
            tree_var: str | None = None
            while True:
                t = ts.peek()
                if t is not None and t[1] == "*":
                    ts.next()
                    k, v = ts.next()
                    if k != "name":
                        raise ParseError("tree variable expected after *")
                    tree_var = v
                    ts.expect(")")
                    break
                preds.append(_parse_pred(ts))
                _, sep = ts.next()
                if sep != ",":
                    raise ParseError(f"expected , in CTP, got {sep!r}")
            if tree_var is None:
                raise ParseError("CTP must end with *treeVar")
            ctps.append(CTP(tuple(preds), tree_var, _parse_ctp_filters(ts)))
        else:
            ts.expect("(")
            p1 = _parse_pred(ts)
            ts.expect(",")
            p2 = _parse_pred(ts)
            ts.expect(",")
            p3 = _parse_pred(ts)
            ts.expect(")")
            edge_patterns.append(EdgePattern(p1, p2, p3))
        t = ts.peek()
        if t is None:
            break
        ts.expect("AND")
    return Query(tuple(head), _group_bgps(edge_patterns), tuple(ctps))


def _group_bgps(patterns: list[EdgePattern]) -> tuple[BGP, ...]:
    """Group edge patterns into maximal variable-connected BGPs."""
    if not patterns:
        return ()
    groups: list[list[EdgePattern]] = []
    group_vars: list[set[str]] = []
    for p in patterns:
        vs = {p.s.var, p.e.var, p.d.var}
        hits = [i for i, gv in enumerate(group_vars) if gv & vs]
        if not hits:
            groups.append([p])
            group_vars.append(set(vs))
        else:
            first = hits[0]
            groups[first].append(p)
            group_vars[first] |= vs
            for i in reversed(hits[1:]):
                groups[first].extend(groups.pop(i))
                group_vars[first] |= group_vars.pop(i)
    return tuple(BGP(tuple(g)) for g in groups)
