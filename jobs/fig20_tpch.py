"""spark-submit entrypoint: Figure 20 - TPC-H with learned cost models.

Usage: spark-submit jobs/fig20_tpch.py [sf]
"""
import sys

from _common import emit, get_spark

from repro.experiments import fig20


def main() -> None:
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    spark = get_spark("fig20_tpch")
    emit(f"Figure 20 - TPC-H (SF={sf})", fig20.run(spark, sf=sf))
    spark.stop()


if __name__ == "__main__":
    main()
