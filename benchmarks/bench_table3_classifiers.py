"""Table 3 benchmark: EMF classifier comparison (MLP vs RF vs LR),
train TPC-H-lite → test TPC-DS-lite. Writes ``results/table3.md``."""
import pytest

from benchmarks.conftest import write_result
from repro.experiments import table3
from repro.nn.pretrained import EPOCHS, TRAIN_PAIRS

N_TEST = 800  # pairs per class in the TPC-DS-lite test set


@pytest.mark.benchmark(group="table3")
def test_table3_classifiers(benchmark, timed_model, results_dir):
    model, train_secs = timed_model
    holder = {}

    def run_once():
        holder["res"] = table3.run(
            model, n_test=N_TEST, seed=200, mlp_train_seconds=train_secs
        )
        return holder["res"]

    benchmark.pedantic(run_once, rounds=1, iterations=1)
    res = holder["res"]
    write_result(
        results_dir,
        "table3",
        res.markdown()
        + f"\n\n(MLP pretrained on {2 * TRAIN_PAIRS} TPC-H-lite pairs, "
        f"{EPOCHS} epochs; 'train s' is cache-load time when warm)",
    )

    by_name = {r.name.split(" ")[0]: r for r in res.rows}
    # the paper's claim: the MLP is decisively better on both metrics
    assert by_name["MLP"].accuracy > by_name["RF"].accuracy + 0.15
    assert by_name["MLP"].accuracy > by_name["LR"].accuracy + 0.15
    assert by_name["MLP"].f1 > max(by_name["RF"].f1, by_name["LR"].f1) + 0.1
    # and its false negatives are far fewer (§7.1.1: β error matters most)
    assert by_name["MLP"].confusion["fn"] < by_name["RF"].confusion["fn"]
    assert by_name["MLP"].confusion["fn"] < by_name["LR"].confusion["fn"]
