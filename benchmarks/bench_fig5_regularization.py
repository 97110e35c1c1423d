"""Fig. 5 benchmark: the λ-sweep harness (ALS training + serving timing)."""
from repro.experiments.fig5 import lambda_sweep


def test_bench_lambda_sweep(benchmark):
    sweep = benchmark.pedantic(
        lambda: lambda_sweep(
            datasets=("netflix",), f=8, scale=0.1, lambdas=(0.01, 1.0), n_iters=4
        ),
        rounds=2,
        iterations=1,
    )
    assert len(sweep) == 2 * 3
