"""SF-group keys (§2.2.1).

Subexpressions that access different table sets or return different
numbers of columns are grouped apart by the schema filter; only pairs
within an SF-group proceed to the VMF/EMF. The key is pure data so it
can be computed driver-side or inside Spark workers.
"""
from __future__ import annotations

from repro.core.plan import Plan, base_tables, output_columns


def sf_key(plan: Plan) -> tuple[tuple[str, ...], int]:
    """(sorted base-table multiset, output arity)."""
    return base_tables(plan), len(output_columns(plan))


def sf_key_str(plan: Plan) -> str:
    """String form of :func:`sf_key` for use as a Spark grouping column."""
    tables, arity = sf_key(plan)
    return "|".join(tables) + f"#{arity}"
