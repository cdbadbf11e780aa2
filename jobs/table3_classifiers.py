"""Table 3 job: MLP vs RF vs LR classifier comparison.

Usage: ``spark-submit jobs/table3_classifiers.py [n_test_per_class]``
"""
import sys
import time

from _common import emit, standalone_session


def run(spark, n_test: int = 800) -> str:
    from repro.experiments import table3
    from repro.nn.pretrained import default_model

    t0 = time.perf_counter()
    model = default_model()
    secs = time.perf_counter() - t0
    res = table3.run(model, n_test=n_test, seed=200, mlp_train_seconds=secs)
    return res.markdown()


def main() -> None:
    spark = standalone_session("geqo-table3")
    try:
        n = int(sys.argv[1]) if len(sys.argv) > 1 else 800
        emit("table3", run(spark, n))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
