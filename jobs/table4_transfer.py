"""Table 4 job: EMF transfer to random schemas at the paper's dataset
sizes. Usage: ``spark-submit jobs/table4_transfer.py [size ...]``"""
import sys

from _common import emit, standalone_session


def run(spark, sizes=None) -> str:
    from repro.experiments import table4
    from repro.nn.pretrained import default_model

    res = table4.run(
        default_model(), sizes=tuple(sizes or table4.PAPER_SIZES), seed=300
    )
    return res.markdown()


def main() -> None:
    spark = standalone_session("geqo-table4")
    try:
        sizes = [int(a) for a in sys.argv[1:]] or None
        emit("table4", run(spark, sizes))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
