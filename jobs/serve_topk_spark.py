"""Distributed serving demo: RECOPT chooses a strategy, Spark serves it.

Usage: spark-submit jobs/serve_topk_spark.py [--scale 1.0]
Serves top-10 for one indexable grid model and one MM-friendly model via
the mapInPandas operators, printing the optimizer's decision for each.
"""
from pyspark.sql import DataFrame, SparkSession

from repro.experiments.grid import reference_grid, strategy_factories
from repro.spark_ops.frames import model_to_user_df
from repro.spark_ops.optimizer import recopt_serve


def run(spark: SparkSession, *, scale: float = 1.0, k: int = 10) -> DataFrame:
    grid = {m.name: m for m in reference_grid(scale=scale)}
    out = None
    for name in ("glove-f32-hi", "netflix-f16-lo"):
        model = grid[name]
        factories = strategy_factories(model)
        users_df = model_to_user_df(spark, model, n_partitions=8)
        out, report = recopt_serve(
            spark,
            users_df,
            model,
            {n: factories[n] for n in ("lemp", "recdex")},
            k=k,
        )
        n_rows = out.count()
        print(
            f"{name}: chose {report.chosen} "
            f"(estimates: { {s: round(t, 3) for s, t in report.est_totals.items()} }) "
            f"rows={n_rows}"
        )
    return out


if __name__ == "__main__":
    from _common import get_spark, scale_arg

    args = scale_arg()
    spark = get_spark("serve-topk")
    run(spark, scale=args.scale).show(20)
    spark.stop()
