"""Fig. 8 benchmarks: the blocking lesion pair, as two benchmark rows.

``shared`` vs ``unshared`` serve time on the same built index is the
paper's lesion study — the ratio between these two benchmarks is the
work-sharing speedup (paper: 2.4× on Netflix-NOMAD, 1.4× on R2-NOMAD).
"""
import pytest

from repro.core.recdex import RecdexIndex

K = 1


@pytest.fixture(scope="module")
def built_pair(grid_models):
    model = grid_models["netflix-f32-hi"]
    block = max(32, model.n // 8)
    shared = RecdexIndex(model, block=block, walk_chunk=32, shared=True)
    shared.build()
    unshared = RecdexIndex(model, block=block, walk_chunk=32, shared=False)
    unshared.build()
    return model, shared, unshared


def test_bench_recdex_serve_shared(benchmark, built_pair):
    model, shared, _ = built_pair
    res = benchmark.pedantic(lambda: shared.query_all(K), rounds=3, iterations=1)
    assert res.ids.shape == (model.m, K)


def test_bench_recdex_serve_unshared_lesion(benchmark, built_pair):
    model, _, unshared = built_pair
    res = benchmark.pedantic(lambda: unshared.query_all(K), rounds=1, iterations=1)
    assert res.ids.shape == (model.m, K)


def test_bench_recdex_build(benchmark, grid_models):
    model = grid_models["netflix-f32-hi"]

    def build():
        idx = RecdexIndex(model, block=max(32, model.n // 8), walk_chunk=32)
        idx.build()
        return idx

    idx = benchmark.pedantic(build, rounds=3, iterations=1)
    assert idx.built
