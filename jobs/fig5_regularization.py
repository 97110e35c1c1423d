"""Fig. 5 (as a table): λ sweep — RMSE and serving runtime per strategy.

Usage: spark-submit jobs/fig5_regularization.py [--scale 0.25]
"""
import json

from pyspark.sql import DataFrame, SparkSession

from repro.experiments.fig5 import lambda_sweep, summarize


def run(spark: SparkSession, *, scale: float = 1.0) -> DataFrame:
    sweep = lambda_sweep(scale=scale)
    print(json.dumps(summarize(sweep), indent=2))
    return spark.createDataFrame(sweep)


if __name__ == "__main__":
    from _common import get_spark, scale_arg

    args = scale_arg(default=1.0)
    spark = get_spark("fig5")
    run(spark, scale=args.scale).show(100, truncate=False)
    spark.stop()
