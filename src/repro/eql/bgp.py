"""BGP -> SQL compiler (step (A) of the §3 evaluation strategy).

Each Basic Graph Pattern compiles to one conjunctive SQL query over the
relational graph encoding ``edges(id, src, label, dst)``, ``nodes(id,
label)``, ``types(id, type)`` — mirroring the paper's
``graph(id, source, edgeLabel, target)`` PostgreSQL table. The emitted SQL
is deliberately engine-neutral: the same string runs on Spark (Catalyst)
and on DuckDB, which is how the oracle tests validate the compiler.
"""
from __future__ import annotations

from ..lang.ast import BGP, Cond, Pred


def _sql_quote(v: str) -> str:
    return "'" + v.replace("'", "''") + "'"


def _like(value: str) -> str:
    """Translate the paper's ~ patterns (* wildcard) to SQL LIKE."""
    return _sql_quote(value.replace("%", r"\%").replace("*", "%"))


def _node_cond_sql(alias: str, c: Cond) -> str:
    if c.prop == "label":
        col = f"{alias}.label"
        if c.op == "~":
            return f"{col} LIKE {_like(c.value)}"
        return f"{col} {c.op} {_sql_quote(c.value)}"
    if c.prop == "type":
        if c.op == "~":
            inner = f"t.type LIKE {_like(c.value)}"
        else:
            inner = f"t.type {c.op} {_sql_quote(c.value)}"
        return (
            f"EXISTS (SELECT 1 FROM types t WHERE t.id = {alias}.id AND {inner})"
        )
    raise ValueError(f"unsupported node property {c.prop!r}")


def _edge_cond_sql(alias: str, c: Cond) -> str:
    if c.prop != "label":
        raise ValueError(f"unsupported edge property {c.prop!r}")
    col = f"{alias}.label"
    if c.op == "~":
        return f"{col} LIKE {_like(c.value)}"
    return f"{col} {c.op} {_sql_quote(c.value)}"


def to_sql(bgp: BGP, project: list[str] | None = None) -> str:
    """Compile a BGP to SQL projecting ``project`` (default: all variables,
    node variables as node ids, edge variables as edge ids)."""
    node_vars: list[str] = bgp.node_vars()
    edge_vars: list[str] = []
    for p in bgp.patterns:
        if p.e.var not in edge_vars:
            edge_vars.append(p.e.var)

    n_alias = {v: f"n_{i}" for i, v in enumerate(node_vars)}
    e_alias = {v: f"e_{i}" for i, v in enumerate(edge_vars)}

    from_parts = [f"edges {e_alias[v]}" for v in edge_vars]
    from_parts += [f"nodes {n_alias[v]}" for v in node_vars]

    where: list[str] = []
    seen_preds: set[tuple[str, Cond]] = set()

    def add_pred(alias: str, pred: Pred, is_edge: bool) -> None:
        for c in pred.conds:
            key = (alias, c)
            if key in seen_preds:
                continue
            seen_preds.add(key)
            where.append(
                _edge_cond_sql(alias, c) if is_edge else _node_cond_sql(alias, c)
            )

    for p in bgp.patterns:
        ea = e_alias[p.e.var]
        where.append(f"{ea}.src = {n_alias[p.s.var]}.id")
        where.append(f"{ea}.dst = {n_alias[p.d.var]}.id")
        add_pred(ea, p.e, is_edge=True)
        add_pred(n_alias[p.s.var], p.s, is_edge=False)
        add_pred(n_alias[p.d.var], p.d, is_edge=False)

    if project is None:
        project = node_vars + edge_vars
    sel = []
    for v in project:
        if v in n_alias:
            sel.append(f"{n_alias[v]}.id AS {v}")
        elif v in e_alias:
            sel.append(f"{e_alias[v]}.id AS {v}")
        else:
            raise ValueError(f"unknown variable {v!r} in projection")
    return (
        "SELECT " + ", ".join(sel)
        + " FROM " + ", ".join(from_parts)
        + (" WHERE " + " AND ".join(where) if where else "")
    )
