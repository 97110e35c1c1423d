"""Spark serving operators: schema, exactness vs kernels, DuckDB oracle.

Oracle checks use small-integer models so float64 arithmetic is exact on
both sides (Spark/NumPy vs DuckDB SUM) and ranks are deterministic.
"""
import numpy as np
import pytest

from repro.core.recdex import RecdexIndex
from repro.indexes.brute_force import BlockedMM
from repro.indexes.fexipro import FexiproIndex
from repro.indexes.lemp import LempIndex
from repro.mf.models import MFModel
from repro.oracle import assert_equivalent
from repro.spark_ops.frames import model_to_user_df
from repro.spark_ops.serving import serve_topk
from repro.validate import TOPK_ORACLE_SQL, matrix_to_long

FACTORIES = {
    "lemp": lambda m: LempIndex(m, bucket_size=16),
    "fexipro-si": lambda m: FexiproIndex(m, variant="SI"),
    "fexipro-sir": lambda m: FexiproIndex(m, variant="SIR"),
    "recdex": lambda m: RecdexIndex(m, n_clusters=4, block=16, walk_chunk=8),
}


def int_model(m=30, n=20, f=4, seed=0):
    g = np.random.default_rng(seed)
    return MFModel(
        name=f"int-{m}x{n}x{f}",
        users=g.integers(-4, 5, size=(m, f)).astype(np.float64),
        items=g.integers(-4, 5, size=(n, f)).astype(np.float64),
    )


@pytest.fixture(scope="module")
def model():
    return int_model()


@pytest.fixture(scope="module")
def users_df(spark, model):
    return model_to_user_df(spark, model, n_partitions=4).cache()


def test_output_schema(spark, model, users_df):
    out = serve_topk(spark, users_df, model, 3)
    assert [f.name for f in out.schema.fields] == ["user_id", "item_id", "rank", "score"]


def test_mm_row_count(spark, model, users_df):
    out = serve_topk(spark, users_df, model, 3)
    assert out.count() == model.m * 3


@pytest.mark.parametrize("k", [1, 5])
def test_mm_against_oracle(spark, model, users_df, k):
    out = serve_topk(spark, users_df, model, k)
    assert_equivalent(
        out,
        TOPK_ORACLE_SQL.format(k=k),
        users_long=matrix_to_long(model.users, "user_id"),
        items_long=matrix_to_long(model.items, "item_id"),
    )


@pytest.mark.parametrize("name", sorted(FACTORIES))
def test_index_operator_against_oracle(spark, model, users_df, name):
    out = serve_topk(spark, users_df, model, 4, strategy=name, factory=FACTORIES[name])
    assert_equivalent(
        out,
        TOPK_ORACLE_SQL.format(k=4),
        users_long=matrix_to_long(model.users, "user_id"),
        items_long=matrix_to_long(model.items, "item_id"),
    )


@pytest.mark.parametrize("name", sorted(FACTORIES))
def test_index_operator_matches_driver_kernel(spark, model, users_df, name):
    """The distributed operator must agree with the single-process strategy."""
    out = (
        serve_topk(spark, users_df, model, 3, strategy=name, factory=FACTORIES[name])
        .toPandas()
        .sort_values(["user_id", "rank"])
    )
    ref = BlockedMM(model).query_all(3)
    got_ids = out["item_id"].to_numpy().reshape(model.m, 3)
    got_scores = out["score"].to_numpy().reshape(model.m, 3)
    order = np.argsort(out["user_id"].to_numpy().reshape(model.m, 3)[:, 0])
    np.testing.assert_array_equal(got_ids[order], ref.ids)
    np.testing.assert_array_equal(got_scores[order], ref.scores)


def test_partitioning_invariance(spark, model):
    """Same result regardless of user partitioning."""
    k = 2
    a = (
        serve_topk(spark, model_to_user_df(spark, model, n_partitions=1), model, k)
        .toPandas().sort_values(["user_id", "rank"]).reset_index(drop=True)
    )
    b = (
        serve_topk(spark, model_to_user_df(spark, model, n_partitions=9), model, k)
        .toPandas().sort_values(["user_id", "rank"]).reset_index(drop=True)
    )
    assert a.equals(b)


def test_unknown_strategy_requires_factory(spark, model, users_df):
    with pytest.raises(ValueError):
        serve_topk(spark, users_df, model, 3, strategy="lemp")


def test_k_exceeds_n_clamped(spark, model, users_df):
    out = serve_topk(spark, users_df, model, 100)
    assert out.count() == model.m * model.n
