"""spark-submit entrypoint: Table 8 - default vs combined per cluster.

Usage: spark-submit jobs/table8_clusters.py   (or: python jobs/table8_clusters.py)
"""
from _common import emit, get_spark

from repro.experiments import table8


def main() -> None:
    spark = get_spark("table8_clusters")
    emit("Table 8 - default vs combined per cluster", table8.run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
