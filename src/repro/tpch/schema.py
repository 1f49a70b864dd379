"""TPC-H-lite table registration for the Figure 20 experiment."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro import synth_data

TABLES = ("lineitem", "orders", "customer", "part", "supplier", "nation")


def load_tables(spark: SparkSession, sf: float, seed: int = 0) -> dict[str, pd.DataFrame]:
    """Generate all TPC-H-lite tables as pandas frames (for DuckDB) and
    register them as Spark temp views. Deterministic in (sf, seed)."""
    frames = {
        "lineitem": synth_data.lineitem(spark, sf=sf, seed=seed).toPandas(),
        "orders": synth_data.orders(spark, sf=sf, seed=seed + 1).toPandas(),
        "customer": synth_data.customer(spark, sf=sf, seed=seed + 2).toPandas(),
        "part": synth_data.part(spark, sf=sf, seed=seed + 5).toPandas(),
        "supplier": synth_data.supplier(spark, sf=sf, seed=seed + 6).toPandas(),
        "nation": synth_data.nation(spark).toPandas(),
    }
    for name, pdf in frames.items():
        spark.createDataFrame(pdf).createOrReplaceTempView(name)
    return frames
