"""Table 5 job: VMF quality on TPC-DS-lite labeled pairs.

Usage: ``spark-submit jobs/table5_vmf.py [n_pairs_per_class]``"""
import sys

from _common import emit, standalone_session


def run(spark, n_pairs: int = 600) -> str:
    from repro.experiments import table5
    from repro.nn.pretrained import default_model

    return table5.run(default_model(), n_pairs=n_pairs, seed=400).markdown()


def main() -> None:
    spark = standalone_session("geqo-table5")
    try:
        n = int(sys.argv[1]) if len(sys.argv) > 1 else 600
        emit("table5", run(spark, n))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
