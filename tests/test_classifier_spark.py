"""Tests for the MLlib MLP detector."""
import numpy as np
import pytest

from repro.features.assemble import build_context
from repro.features.correlation import top_related
from repro.training.classifier import train_predict_attribute
from repro.training.construct import AttrTrainingData


@pytest.fixture(scope="module")
def ctx(hospital_stats):
    return build_context(
        hospital_stats, top_related(hospital_stats, 1), {a: [] for a in hospital_stats.attrs}
    )


def test_single_class_guard_clean(spark, ctx):
    td = AttrTrainingData(real_positions=[0, 1, 2], real_labels=[0, 0, 0])
    X = np.random.default_rng(0).random((10, 4))
    pred = train_predict_attribute(spark, ctx, "city", td, X)
    assert pred.dtype == bool and not pred.any()


def test_single_class_guard_dirty(spark, ctx):
    td = AttrTrainingData(real_positions=[0, 1], real_labels=[1, 1])
    X = np.random.default_rng(0).random((6, 4))
    pred = train_predict_attribute(spark, ctx, "city", td, X)
    assert pred.all()


def test_empty_training(spark, ctx):
    td = AttrTrainingData()
    X = np.random.default_rng(0).random((5, 4))
    pred = train_predict_attribute(spark, ctx, "city", td, X)
    assert not pred.any()


def test_learns_separable_signal(spark, ctx):
    g = np.random.default_rng(0)
    X = g.random((200, 6))
    y = (X[:, 2] > 0.5).astype(int)
    td = AttrTrainingData(real_positions=list(range(150)), real_labels=list(y[:150]))
    pred = train_predict_attribute(spark, ctx, "city", td, X, max_iter=80, seed=0)
    acc = (pred == y.astype(bool)).mean()
    assert acc > 0.9
