"""Fuzzer + rewrite-rule tests.

The load-bearing property: every rewrite family produces a variant the
AV proves equivalent AND the DuckDB model checker cannot distinguish.
This is the soundness chain the whole evaluation rests on.
"""
import numpy as np
import pytest

from repro.core.plan import Project, base_tables, node_count, to_json
from repro.core.sqlgen import to_sql
from repro.verifier.av import verify
from repro.verifier.model_check import counterexample
from repro.workload.generator import random_base_plan, random_plans
from repro.workload.rewrites import (
    IMPLICATION,
    NORMALIZATION,
    REWRITES,
    SYNTACTIC,
    decompose,
    compose,
    equivalent_variant,
)
from repro.workload.schema import TPCDS_LITE, TPCH_LITE, random_schema


def test_random_plans_deterministic():
    a = random_plans(TPCH_LITE, 10, seed=7)
    b = random_plans(TPCH_LITE, 10, seed=7)
    assert [to_json(p) for p in a] == [to_json(p) for p in b]


def test_random_plans_valid_sql():
    for p in random_plans(TPCDS_LITE, 20, seed=1):
        assert isinstance(p, Project)
        to_sql(p)  # raises if malformed


def test_random_plans_table_variety():
    counts = {len(base_tables(p)) for p in random_plans(TPCH_LITE, 40, seed=3)}
    assert {1, 2, 3} <= counts


def test_random_schema_connected():
    s = random_schema(11)
    reachable = {s.tables[0].name}
    frontier = [s.tables[0].name]
    while frontier:
        t = frontier.pop()
        for nb, _, _ in s.neighbors(t):
            if nb not in reachable:
                reachable.add(nb)
                frontier.append(nb)
    assert reachable == {t.name for t in s.tables}


def test_decompose_compose_roundtrip_equivalence():
    g = np.random.default_rng(5)
    for _ in range(5):
        p = random_base_plan(TPCH_LITE, g)
        aliases, jps, fps, proj = decompose(p)
        rebuilt = compose(aliases, jps, fps, proj)
        assert verify(p, rebuilt)


@pytest.mark.parametrize("family", sorted(REWRITES))
def test_each_rewrite_family_sound(family):
    """For each family: find plans where it applies; variant must be
    AV-equivalent and model-check-indistinguishable."""
    g = np.random.default_rng(hash(family) % 2**31)
    applied = 0
    for i in range(60):
        p = random_base_plan(TPCH_LITE, g)
        v = REWRITES[family](p, g)
        if v is None or v == p:
            continue
        applied += 1
        assert verify(p, v), f"{family} broke AV-equivalence on {p}"
        cx = counterexample(p, v, trials=3, rows=30, seed=i)
        assert cx is None, f"{family} changed results (seed {cx})"
        if applied >= 4:
            break
    assert applied > 0, f"{family} never applied in 60 tries"


def test_equivalent_variant_chains_sound():
    g = np.random.default_rng(42)
    checked = 0
    for i in range(12):
        p = random_base_plan(TPCDS_LITE, g)
        v, applied = equivalent_variant(p, g, steps=4)
        if not applied:
            continue
        checked += 1
        assert verify(p, v)
        assert counterexample(p, v, trials=2, rows=30, seed=i) is None
    assert checked >= 8


def test_variant_changes_surface_form():
    g = np.random.default_rng(9)
    changed = 0
    for _ in range(10):
        p = random_base_plan(TPCH_LITE, g)
        v, applied = equivalent_variant(p, g, steps=3)
        if applied and to_json(v) != to_json(p):
            changed += 1
    assert changed >= 6


def test_family_partition_complete():
    assert set(SYNTACTIC) | set(NORMALIZATION) | set(IMPLICATION) == set(REWRITES)
    assert not (set(SYNTACTIC) & set(NORMALIZATION))
    assert not (set(NORMALIZATION) & set(IMPLICATION))
