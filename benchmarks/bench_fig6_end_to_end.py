"""Fig. 6 benchmarks: per-strategy end-to-end serving wall-clock.

Two representative grid models bracket the paper's regimes:

* ``glove-f32-hi`` — indexable (tight user cones, wide item norms);
  LEMP/RECDEX should beat MM here, as on the paper's Yahoo models.
* ``netflix-f16-lo`` — MM-friendly; MM should win, as on the paper's
  Netflix models.

FEXIPRO (point-query) is benchmarked on the smaller-item Netflix analog
only — it is the paper's slowest batch strategy by an order of magnitude
and the benchmark suite should stay minutes-scale.
"""
import pytest

from repro.experiments.grid import strategy_factories
from repro.experiments.timing import time_strategy

K = 10


@pytest.mark.parametrize("strategy", ["mm", "lemp", "recdex"])
@pytest.mark.parametrize("model_name", ["glove-f32-hi", "netflix-f16-lo"])
def test_bench_batch_strategies(benchmark, grid_models, model_name, strategy):
    model = grid_models[model_name]
    factory = strategy_factories(model)[strategy]
    res = benchmark.pedantic(
        lambda: time_strategy(factory, model, K).result, rounds=3, iterations=1
    )
    assert res.ids.shape == (model.m, K)


@pytest.mark.parametrize("strategy", ["fexipro-si", "fexipro-sir"])
def test_bench_fexipro_point_query(benchmark, grid_models, strategy):
    model = grid_models["netflix-f16-hi"]
    factory = strategy_factories(model)[strategy]
    res = benchmark.pedantic(
        lambda: time_strategy(factory, model, K).result, rounds=1, iterations=1
    )
    assert res.ids.shape == (model.m, K)
