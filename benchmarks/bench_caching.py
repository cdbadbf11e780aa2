"""Result caching benchmark (§7.7 / Figure 15): workload runtime
reduction from GEqO-driven result caching on Spark + TPC-H-lite at
SF=0.05, across storage budgets. Writes ``results/caching.md``."""
import pytest

from benchmarks.conftest import write_result
from repro.experiments import caching_study


@pytest.mark.benchmark(group="caching")
def test_caching_case_study(benchmark, spark, timed_model, results_dir, tmp_path):
    model, _ = timed_model
    holder = {}

    def run_once():
        holder["res"] = caching_study.run(
            spark, model,
            n_classes=6, class_size=3, n_singletons=6, sf=0.2,
            budgets=(0.1, 0.5, 1.0),
            cache_dir=str(tmp_path / "cache"),
            seed=600,
        )
        return holder["res"]

    benchmark.pedantic(run_once, rounds=1, iterations=1)
    res = holder["res"]
    write_result(results_dir, "caching", res.markdown())

    # shape: savings are monotone in budget and material at full budget
    s = [res.report.savings(b) for b in res.budgets]
    assert s[0] <= s[-1] + 0.05
    assert s[-1] > 0.05
    assert res.n_classes_multi >= 4  # GEqO actually found reuse
