"""spark-submit entrypoint: Table 1 - regression loss functions.

Usage: spark-submit jobs/table1_loss_functions.py   (or: python jobs/table1_loss_functions.py)
"""
from _common import emit, get_spark

from repro.experiments import table1


def main() -> None:
    spark = get_spark("table1_loss_functions")
    emit("Table 1 - regression loss functions", table1.run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
