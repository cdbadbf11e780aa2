"""End-to-end GEqO cascade tests (Equation 1/2 semantics)."""
import pytest

from repro.core.pipeline import geqo_set_local, geqo_set_spark
from repro.filters.vmf import calibrate_tau
from repro.verifier.av import Verifier
from repro.workload.labeler import make_planted_workload, make_positive_pairs
from repro.workload.schema import TPCDS_LITE


@pytest.fixture(scope="module")
def workload():
    return make_planted_workload(TPCDS_LITE, n_subexpr=50, n_equiv=6, seed=17)


@pytest.fixture(scope="module")
def tau(emf_model):
    pos = make_positive_pairs(TPCDS_LITE, 60, seed=18)
    return calibrate_tau(emf_model, [(p.p1, p.p2) for p in pos])


def test_local_pipeline_finds_planted(emf_model, tau, workload):
    res = geqo_set_local(workload.plans, emf_model, tau=tau)
    found = workload.planted & res.pairs
    # near-perfect recall (paper: GEqO TPR ≈ 0.88–0.93)
    assert len(found) >= len(workload.planted) - 1
    # perfect precision by construction: every reported pair is AV-verified
    v = Verifier()
    for i, j in res.pairs:
        assert v.equivalent(workload.plans[i], workload.plans[j])


def test_pipeline_prunes_monotonically(emf_model, tau, workload):
    res = geqo_set_local(workload.plans, emf_model, tau=tau)
    assert res.survivors["SF"] <= res.n_total_pairs
    assert res.survivors["VMF"] <= res.survivors["SF"]
    assert res.survivors["EMF"] <= res.survivors["VMF"]
    assert res.survivors["AV"] <= res.survivors["EMF"]
    # the filters must prune hard: AV workload ≪ total pairs
    assert res.av_pairs_checked < res.n_total_pairs * 0.25


def test_ablation_subsets_run(emf_model, tau, workload):
    """Every nonempty filter subset is executable and sound (Fig 14)."""
    subsets = [("SF",), ("VMF",), ("EMF",), ("SF", "EMF"), ("SF", "VMF"),
               ("VMF", "EMF"), ("SF", "VMF", "EMF")]
    full = geqo_set_local(workload.plans, emf_model, tau=tau).pairs
    for fs in subsets:
        res = geqo_set_local(workload.plans, emf_model, filters=fs, tau=tau)
        v = Verifier()
        for i, j in res.pairs:
            assert v.equivalent(workload.plans[i], workload.plans[j])


def test_spark_pipeline_matches_local(spark, emf_model, tau, workload):
    local = geqo_set_local(workload.plans, emf_model, tau=tau)
    dist = geqo_set_spark(spark, workload.plans, emf_model, tau=tau)
    assert dist.pairs == local.pairs
    assert dist.survivors["SF"] == local.survivors["SF"]
    assert dist.survivors["VMF"] == local.survivors["VMF"]
    assert dist.survivors["EMF"] == local.survivors["EMF"]


def test_pipeline_empty_and_tiny_workloads(emf_model):
    res = geqo_set_local([], emf_model)
    assert res.pairs == set() and res.n_total_pairs == 0
    w = make_planted_workload(TPCDS_LITE, n_subexpr=2, n_equiv=1, seed=1)
    res = geqo_set_local(w.plans, emf_model, tau=5.0)
    assert w.planted <= res.pairs
