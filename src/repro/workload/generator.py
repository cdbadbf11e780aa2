"""SPJ query fuzzer — the repo's AMOEBA [34] substitute.

AMOEBA's role in the paper is to produce a diverse set of *base* SPJ
queries on a schema; WeTune-style rewrite rules then derive equivalent
variants (:mod:`repro.workload.rewrites`). This fuzzer walks the schema
join graph to pick 1–3 tables, adds equi-join predicates along edges,
sprinkles selection predicates (column-vs-constant and
column-vs-column±constant), and projects 1–4 referenced columns.

All randomness flows through a caller-supplied ``numpy`` Generator, so
workloads are reproducible from a seed.
"""
from __future__ import annotations

import numpy as np

from repro.core.plan import BinOp, Col, Comparison, Const, Filter, Join, Plan, Project, Scan
from repro.workload.schema import Schema

_SEL_OPS = ["<", "<=", ">", ">=", "="]


def _pick(g: np.random.Generator, xs):
    return xs[int(g.integers(0, len(xs)))]


def random_base_plan(
    schema: Schema,
    g: np.random.Generator,
    *,
    max_tables: int = 3,
    min_tables: int = 1,
    max_selections: int = 4,
    tables: tuple[str, ...] | None = None,
    max_proj: int = 4,
) -> Plan:
    """One random SPJ plan with a root Project.

    Tables are distinct (no self-joins) — this keeps the verifier's
    alias-bijection search small and matches the SPJ-with-conjunctive-
    predicates scope the paper evaluates on. ``tables`` restricts the
    join-graph walk to a pool (used to control SF-group density: the
    §7.5 workloads concentrate many subexpressions on few table sets).
    """
    # --- pick a connected set of tables by walking the join graph ----
    pool = tables or tuple(t.name for t in schema.tables)
    start = _pick(g, [t for t in pool])
    chosen = [start]
    join_preds: list[Comparison] = []
    target = min(int(g.integers(min_tables, max_tables + 1)), len(pool))
    while len(chosen) < target:
        frontier = [
            (t, nb, c_t, c_nb)
            for t in chosen
            for nb, c_t, c_nb in schema.neighbors(t)
            if nb not in chosen and nb in pool
        ]
        if not frontier:
            break
        t, nb, c_t, c_nb = _pick(g, frontier)
        chosen.append(nb)
        join_preds.append(
            Comparison(Col(t, c_t), "=", Col(nb, c_nb))
        )
    # Aliases equal table names (tables are distinct).
    plan: Plan = Scan(chosen[0], chosen[0])
    joined = {chosen[0]}
    pending = list(join_preds)
    while pending:
        # attach the next table whose join pred touches the joined set
        for i, jp in enumerate(pending):
            a1, a2 = jp.lhs.alias, jp.rhs.alias
            if a1 in joined and a2 not in joined:
                new = a2
            elif a2 in joined and a1 not in joined:
                new = a1
            else:
                continue
            plan = Join(plan, Scan(new, new), jp)
            joined.add(new)
            pending.pop(i)
            break
        else:  # pragma: no cover — unreachable with connected walks
            raise AssertionError("disconnected join predicate")

    # --- selection predicates ---------------------------------------
    n_sel = int(g.integers(1, max_selections + 1))
    for _ in range(n_sel):
        t = _pick(g, chosen)
        col = Col(t, _pick(g, schema.table(t).columns))
        op = _pick(g, _SEL_OPS)
        if len(chosen) > 1 and g.random() < 0.3:
            # column-vs-column(+const) predicate across tables
            t2 = _pick(g, [c for c in chosen if c != t])
            col2 = Col(t2, _pick(g, schema.table(t2).columns))
            off = int(g.integers(-15, 16))
            rhs = BinOp("+", col2, Const(float(off))) if off else col2
            plan = Filter(Comparison(col, op, rhs), plan)
        else:
            v = float(int(g.integers(-20, 51)))
            plan = Filter(Comparison(col, op, Const(v)), plan)

    # --- projection ---------------------------------------------------
    n_proj = int(g.integers(1, max_proj + 1))
    cols = []
    for _ in range(n_proj):
        t = _pick(g, chosen)
        cols.append(Col(t, _pick(g, schema.table(t).columns)))
    return Project(tuple(cols), plan)


def random_plans(schema: Schema, n: int, *, seed: int = 0, **kw) -> list[Plan]:
    g = np.random.default_rng(seed)
    return [random_base_plan(schema, g, **kw) for _ in range(n)]
