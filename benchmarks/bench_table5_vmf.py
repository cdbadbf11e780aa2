"""Table 5 benchmark: VMF quality as a pairwise filter on TPC-DS-lite
labeled pairs (train TPC-H). Writes ``results/table5.md``."""
import pytest

from benchmarks.conftest import write_result
from repro.experiments import table5

N_PAIRS = 600  # per class


@pytest.mark.benchmark(group="table5")
def test_table5_vmf(benchmark, timed_model, results_dir):
    model, _ = timed_model
    holder = {}

    def run_once():
        holder["res"] = table5.run(model, n_pairs=N_PAIRS, seed=400)
        return holder["res"]

    benchmark.pedantic(run_once, rounds=1, iterations=1)
    res = holder["res"]
    write_result(results_dir, "table5", res.markdown())

    # the paper's VMF profile: recall ≈ 0.98 with only moderate
    # precision — a wide-net pre-filter, not a classifier
    assert res.recall >= 0.9
    assert res.precision < 0.95
    assert res.accuracy >= 0.6
