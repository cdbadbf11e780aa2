"""SF / VMF / EMF filter tests, driver-side and Spark-side."""
import numpy as np
import pytest

from repro.core.plan import from_json, to_json
from repro.filters.emf_filter import emf_scores, emf_scores_spark
from repro.filters.keys import sf_key
from repro.filters.schema_filter import (
    sf_candidate_pairs,
    sf_groups,
    sf_pair_pass,
    workload_to_df,
)
from repro.filters.vmf import VMF, calibrate_tau, vmf_candidates_spark
from repro.workload.labeler import make_planted_workload, make_positive_pairs
from repro.workload.schema import TPCDS_LITE, TPCH_LITE
from tests.test_plan import fig1_q1, fig1_q2


@pytest.fixture(scope="module")
def workload():
    return make_planted_workload(TPCH_LITE, n_subexpr=60, n_equiv=6, seed=3)


@pytest.fixture(scope="module")
def tau(emf_model):
    pos = make_positive_pairs(TPCH_LITE, 60, seed=9)
    return calibrate_tau(emf_model, [(p.p1, p.p2) for p in pos])


def test_sf_pair_pass_figure1():
    assert sf_pair_pass(fig1_q1(), fig1_q2())


def test_sf_groups_partition(workload):
    groups = sf_groups(workload.plans)
    assert sum(len(v) for v in groups.values()) == len(workload.plans)
    for key, idxs in groups.items():
        for i in idxs:
            assert sf_key(workload.plans[i]) == key


def test_sf_admits_all_planted(workload):
    """SF must not reject any true equivalence (planted pairs share keys)."""
    for i, j in workload.planted:
        assert sf_pair_pass(workload.plans[i], workload.plans[j])


def test_vmf_high_recall_on_planted(emf_model, tau, workload):
    vmf = VMF(emf_model, tau=tau)
    cand = vmf.candidate_pairs(workload.plans)
    found = sum(1 for p in workload.planted if p in cand)
    assert found >= len(workload.planted) - 1  # near-perfect recall
    # and it prunes: candidates well below SF-pair count
    sf_pairs = sum(
        len(v) * (len(v) - 1) // 2 for v in sf_groups(workload.plans).values()
    )
    assert len(cand) < sf_pairs


def test_vmf_pair_distance_zero_for_identical(emf_model):
    vmf = VMF(emf_model)
    assert vmf.pair_distance(fig1_q1(), fig1_q1()) < 1e-9


def test_emf_scores_shape_and_range(emf_model, workload):
    pairs = [(workload.plans[i], workload.plans[j]) for i, j in list(workload.planted)[:4]]
    s = emf_scores(emf_model, pairs)
    assert s.shape == (4,)
    assert np.all((s >= 0) & (s <= 1))


def test_emf_scores_separate_planted_from_random(emf_model, workload):
    planted = [(workload.plans[i], workload.plans[j]) for i, j in workload.planted]
    g = np.random.default_rng(0)
    groups = [v for v in sf_groups(workload.plans).values() if len(v) > 1]
    rand_pairs = []
    planted_set = set(workload.planted)
    while len(rand_pairs) < 10:
        idxs = groups[int(g.integers(0, len(groups)))]
        i, j = g.choice(idxs, 2, replace=False)
        i, j = int(min(i, j)), int(max(i, j))
        if (i, j) not in planted_set:
            rand_pairs.append((workload.plans[i], workload.plans[j]))
    sp = emf_scores(emf_model, planted)
    sr = emf_scores(emf_model, rand_pairs)
    assert sp.mean() > sr.mean() + 0.2


# ---------------------------------------------------------------- Spark


def test_workload_df_roundtrip(spark, workload):
    df = workload_to_df(spark, workload.plans)
    rows = df.orderBy("id").collect()
    assert len(rows) == len(workload.plans)
    assert from_json(rows[0].plan) == workload.plans[0]


def test_sf_candidate_pairs_spark_matches_driver(spark, workload):
    df = workload_to_df(spark, workload.plans)
    got = {
        (r.id1, r.id2) for r in sf_candidate_pairs(df).collect()
    }
    expect = set()
    for idxs in sf_groups(workload.plans).values():
        for a in range(len(idxs)):
            for b in range(a + 1, len(idxs)):
                expect.add((min(idxs[a], idxs[b]), max(idxs[a], idxs[b])))
    assert got == expect


def test_vmf_spark_matches_driver(spark, emf_model, tau, workload):
    df = workload_to_df(spark, workload.plans)
    got = {(r.id1, r.id2) for r in vmf_candidates_spark(df, emf_model, tau=tau).collect()}
    expect = VMF(emf_model, tau=tau).candidate_pairs(workload.plans)
    assert got == expect


def test_emf_spark_matches_driver(spark, emf_model, workload):
    pairs = sorted(workload.planted)[:5]
    rows = [
        (i, j, to_json(workload.plans[i]), to_json(workload.plans[j]))
        for i, j in pairs
    ]
    df = spark.createDataFrame(
        rows, "id1 long, id2 long, plan1 string, plan2 string"
    )
    got = {
        (r.id1, r.id2): r.proba for r in emf_scores_spark(df, emf_model).collect()
    }
    expect = emf_scores(
        emf_model, [(workload.plans[i], workload.plans[j]) for i, j in pairs]
    )
    for (pair, p_spark), p_drv in zip(sorted(got.items()), expect):
        assert abs(p_spark - p_drv) < 1e-9
