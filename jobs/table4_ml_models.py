"""spark-submit entrypoint: Table 4 - ML algorithms for operator-subgraph models.

Usage: spark-submit jobs/table4_ml_models.py   (or: python jobs/table4_ml_models.py)
"""
from _common import emit, get_spark

from repro.experiments import table4


def main() -> None:
    spark = get_spark("table4_ml_models")
    emit("Table 4 - ML algorithms for operator-subgraph models", table4.run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
