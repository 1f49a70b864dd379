"""spark-submit entrypoint: Figure 9 - workload composition table.

Usage: spark-submit jobs/fig9_workload.py
"""
from _common import emit, get_spark

from repro.experiments import fig9


def main() -> None:
    spark = get_spark("fig9_workload")
    emit("Figure 9 - workload composition", fig9.run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
