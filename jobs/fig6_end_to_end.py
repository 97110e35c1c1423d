"""Fig. 6 (as a table): end-to-end strategy runtimes over the model grid.

Usage: spark-submit jobs/fig6_end_to_end.py [--scale 1.0]
Prints the per-combination runtimes and the Section-6.3 summary stats.
"""
import json

from pyspark.sql import DataFrame, SparkSession

from repro.experiments.fig6 import end_to_end, summarize
from repro.experiments.grid import reference_grid


def run(spark: SparkSession, *, scale: float = 1.0) -> DataFrame:
    times = end_to_end(reference_grid(scale=scale))
    print(json.dumps(summarize(times), indent=2))
    return spark.createDataFrame(times)


if __name__ == "__main__":
    from _common import get_spark, scale_arg

    args = scale_arg()
    spark = get_spark("fig6")
    run(spark, scale=args.scale).show(500, truncate=False)
    spark.stop()
