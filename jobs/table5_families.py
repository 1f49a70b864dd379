"""spark-submit entrypoint: Table 5 - learned model families.

Usage: spark-submit jobs/table5_families.py   (or: python jobs/table5_families.py)
"""
from _common import emit, get_spark

from repro.experiments import table5


def main() -> None:
    spark = get_spark("table5_families")
    emit("Table 5 - learned model families", table5.run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
