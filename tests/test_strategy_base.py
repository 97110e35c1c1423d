"""Tests for the Strategy protocol and TopK container."""
import numpy as np
import pytest

from repro.core.recdex import RecdexIndex
from repro.indexes.base import TopK
from repro.indexes.brute_force import BlockedMM
from repro.indexes.fexipro import FexiproIndex
from repro.indexes.lemp import LempIndex
from repro.mf.models import tiny_model


def test_topk_row_accessor():
    t = TopK(ids=np.array([[1, 2], [3, 4]]), scores=np.array([[9.0, 8.0], [7.0, 6.0]]))
    ids, sc = t.row(1)
    np.testing.assert_array_equal(ids, [3, 4])
    np.testing.assert_array_equal(sc, [7.0, 6.0])


def test_batching_flags():
    m = tiny_model()
    assert BlockedMM(m).batching is True
    assert LempIndex(m).batching is True
    assert RecdexIndex(m).batching is True
    assert FexiproIndex(m).batching is False


def test_strategy_names():
    m = tiny_model()
    assert BlockedMM(m).name == "mm"
    assert LempIndex(m).name == "lemp"
    assert RecdexIndex(m).name == "recdex"


def test_build_sets_flag():
    m = tiny_model()
    for strat in (BlockedMM(m), LempIndex(m, bucket_size=8), RecdexIndex(m, block=8)):
        assert not strat.built
        strat.build()
        assert strat.built


def test_query_all_equals_query_arange():
    m = tiny_model(m=9, n=7, f=3, seed=2)
    strat = LempIndex(m, bucket_size=4)
    a = strat.query_all(2)
    b = strat.query(np.arange(9), 2)
    np.testing.assert_array_equal(a.ids, b.ids)
