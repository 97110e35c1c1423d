"""Table 2: RECOPT effectiveness over the model grid.

Usage: spark-submit jobs/table2_optimizer.py [--scale 1.0]
Prints our measured Table 2 next to the paper's reported numbers, the
Fig. 6 per-combination runtimes it is computed from, and the Section-6.3
summary statistics.  All frames are also written to ``results/``.
"""
import json
import pathlib

from pyspark.sql import DataFrame, SparkSession

from repro.experiments.fig6 import end_to_end, summarize
from repro.experiments.grid import reference_grid
from repro.experiments.table2 import PAPER_TABLE2, optimizer_table

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"


def run(spark: SparkSession, *, scale: float = 1.0) -> DataFrame:
    models = reference_grid(scale=scale)
    times = end_to_end(models)
    print("=== fig6 summary (Section 6.3 stats) ===")
    print(json.dumps(summarize(times), indent=2))
    table, detail = optimizer_table(times, models)
    print("=== Table 2, measured (this run) ===")
    print(table.round(3).to_string())
    print("=== Table 2, paper ===")
    print(PAPER_TABLE2.round(3).to_string())
    RESULTS.mkdir(exist_ok=True)
    times.to_csv(RESULTS / "fig6_times.csv", index=False)
    detail.to_csv(RESULTS / "table2_detail.csv", index=False)
    table.to_csv(RESULTS / "table2.csv")
    return spark.createDataFrame(table.reset_index())


if __name__ == "__main__":
    from _common import get_spark, scale_arg

    args = scale_arg()
    spark = get_spark("table2")
    run(spark, scale=args.scale).show(truncate=False)
    spark.stop()
