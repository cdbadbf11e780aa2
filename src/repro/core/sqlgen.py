"""Render SPJ plans to SQL (DuckDB and Spark SQL share this dialect).

Inner joins and filters commute, so a plan renders to a flat
``SELECT … FROM … WHERE …``; surface differences live in the IR, not in
the generated SQL. Output columns are aliased positionally (``p0…pk``)
so result equality between two plans is well-defined regardless of
source column names — this matches the paper's semantics
``q_i(d) = q_j(d)`` (§2.1).
"""
from __future__ import annotations

from repro.core.plan import (
    BinOp,
    Col,
    Comparison,
    Const,
    Expr,
    Plan,
    Project,
    bfs,
    output_columns,
    predicates,
    scans,
)

_SQL_OP = {"=": "=", "!=": "<>", "<": "<", "<=": "<=", ">": ">", ">=": ">="}


def expr_to_sql(e: Expr) -> str:
    if isinstance(e, Col):
        return f"{e.alias}.{e.column}"
    if isinstance(e, Const):
        v = e.value
        return repr(int(v)) if float(v).is_integer() else repr(float(v))
    return f"({expr_to_sql(e.left)} {e.op} {expr_to_sql(e.right)})"


def comparison_to_sql(c: Comparison) -> str:
    return f"{expr_to_sql(c.lhs)} {_SQL_OP[c.op]} {expr_to_sql(c.rhs)}"


def to_sql(plan: Plan) -> str:
    """Flat SQL for an (inner-join-only) SPJ plan with a root Project."""
    for n in bfs(plan):
        if getattr(n, "jointype", "inner") != "inner":
            raise ValueError("only inner joins render to flat SQL")
    if not isinstance(plan, Project):
        raise ValueError("experiment plans must have a root Project")
    proj = ", ".join(
        f"{c.alias}.{c.column} AS p{i}" for i, c in enumerate(output_columns(plan))
    )
    frm = ", ".join(f"{s.table} AS {s.alias}" for s in scans(plan))
    preds = predicates(plan)
    where = " AND ".join(comparison_to_sql(p) for p in preds)
    sql = f"SELECT {proj} FROM {frm}"
    if where:
        sql += f" WHERE {where}"
    return sql
