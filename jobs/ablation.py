"""Filter ablation job (Figure 14 as a table).

Usage: ``spark-submit jobs/ablation.py [n_subexpr] [n_equiv]``"""
import sys

from _common import emit, standalone_session


def run(spark, n_subexpr: int = 160, n_equiv: int = 32) -> str:
    from repro.experiments import ablation
    from repro.nn.pretrained import default_model

    return ablation.run(
        default_model(), n_subexpr=n_subexpr, n_equiv=n_equiv, seed=500
    ).markdown()


def main() -> None:
    spark = standalone_session("geqo-ablation")
    try:
        n = int(sys.argv[1]) if len(sys.argv) > 1 else 160
        e = int(sys.argv[2]) if len(sys.argv) > 2 else 32
        emit("ablation", run(spark, n, e))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
