"""Canonical flat form of an SPJ plan.

Inner joins and selections commute freely, so an SPJ plan is fully
characterized by (alias → base table map, conjunction of constraints,
positional projection). The verifier and the optimizer-rule baseline
both work on this form; only the verifier adds implication reasoning
on top of it.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.plan import Filter, Join, Plan, Project, bfs, output_columns
from repro.solver.linexpr import Constraint


@dataclass(frozen=True)
class FlatSPJ:
    """Flattened SPJ subexpression."""

    aliases: tuple[tuple[str, str], ...]  # sorted (alias, base table)
    constraints: tuple[Constraint, ...]  # deduped, sorted by repr
    projection: tuple[str, ...]  # positional column keys "alias.column"


def flatten(plan: Plan) -> FlatSPJ:
    """Flatten an inner-join SPJ plan with a root Project."""
    aliases: dict[str, str] = {}
    constraints: list[Constraint] = []
    for n in bfs(plan):
        if isinstance(n, Join):
            if n.jointype != "inner":
                raise ValueError("verifier handles inner joins only")
            constraints.append(n.pred.to_constraint())
        elif isinstance(n, Filter):
            constraints.append(n.pred.to_constraint())
        elif hasattr(n, "table"):
            aliases[n.alias] = n.table
    proj = tuple(c.key for c in output_columns(plan))
    dedup = sorted(set(constraints), key=repr)
    return FlatSPJ(tuple(sorted(aliases.items())), tuple(dedup), proj)
