"""Table 2 benchmarks: RECOPT wall-clock vs the strategies it arbitrates.

The benchmark compares, on one indexable and one MM-friendly model:

* the RECOPT end-to-end run (optimize + serve), and
* each fixed strategy alone,

so the benchmark table itself shows the paper's claim: RECOPT lands near
the per-model winner regardless of which strategy that is, at a small
overhead.
"""
import pytest

from repro.core.recopt import Recopt
from repro.experiments.grid import strategy_factories
from repro.experiments.timing import time_strategy

K = 10
MODELS = ["glove-f32-hi", "netflix-f16-lo"]


@pytest.mark.parametrize("model_name", MODELS)
def test_bench_recopt_mm_recdex(benchmark, grid_models, model_name):
    model = grid_models[model_name]
    factories = strategy_factories(model)

    def run():
        res, report = Recopt(
            model, {"recdex": factories["recdex"]}, k=K, min_sample=64
        ).run()
        return res, report

    res, report = benchmark.pedantic(run, rounds=3, iterations=1)
    assert res.ids.shape == (model.m, K)
    assert report.chosen in ("mm", "recdex")


@pytest.mark.parametrize("model_name", MODELS)
def test_bench_recopt_three_way(benchmark, grid_models, model_name):
    model = grid_models[model_name]
    factories = strategy_factories(model)

    def run():
        return Recopt(
            model,
            {"recdex": factories["recdex"], "lemp": factories["lemp"]},
            k=K,
            min_sample=64,
        ).run()

    res, report = benchmark.pedantic(run, rounds=3, iterations=1)
    assert report.chosen in ("mm", "recdex", "lemp")


@pytest.mark.parametrize("strategy", ["mm", "recdex"])
@pytest.mark.parametrize("model_name", MODELS)
def test_bench_fixed_strategy_baseline(benchmark, grid_models, model_name, strategy):
    model = grid_models[model_name]
    factory = strategy_factories(model)[strategy]
    res = benchmark.pedantic(
        lambda: time_strategy(factory, model, K).result, rounds=3, iterations=1
    )
    assert res.ids.shape == (model.m, K)
