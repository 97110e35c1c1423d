"""Table 1: dataset statistics — paper datasets vs synthetic analogs.

Usage: spark-submit jobs/table1_datasets.py [--scale 1.0]
"""
from pyspark.sql import DataFrame, SparkSession

from repro.experiments.table1 import dataset_table


def run(spark: SparkSession, *, scale: float = 1.0) -> DataFrame:
    return spark.createDataFrame(dataset_table(scale=scale).reset_index())


if __name__ == "__main__":
    from _common import get_spark, scale_arg

    args = scale_arg()
    spark = get_spark("table1")
    df = run(spark, scale=args.scale)
    df.show(truncate=False)
    spark.stop()
