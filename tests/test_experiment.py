"""Tests for the shared experiment harness (paper Sec. V-B protocol)."""
import pandas as pd
import pytest

from repro.core.experiment import make_experiment, score_edge_predictions
from repro.ml.metrics import prf_table
from repro.socialnet.generator import MAJOR_TYPES


@pytest.fixture(scope="module")
def ex(spark):
    return make_experiment(spark, n_nodes=300, seed=7)


def test_labeled_fraction(ex):
    major = ex.net.edges[ex.net.edges["label"].isin(MAJOR_TYPES)]
    assert len(ex.labeled) == pytest.approx(0.4 * len(major), abs=2)


def test_train_test_split_80_20(ex):
    assert len(ex.train) == pytest.approx(0.8 * len(ex.labeled), abs=2)
    assert len(ex.train) + len(ex.test) == len(ex.labeled)


def test_train_test_disjoint(ex):
    tr = set(zip(ex.train["src"], ex.train["dst"]))
    te = set(zip(ex.test["src"], ex.test["dst"]))
    assert not (tr & te)


def test_only_major_types_labeled(ex):
    assert set(ex.labeled["label"]).issubset(set(MAJOR_TYPES))


def test_split_deterministic(spark):
    a = make_experiment(spark, n_nodes=200, seed=3)
    b = make_experiment(spark, n_nodes=200, seed=3)
    pd.testing.assert_frame_equal(a.train, b.train)
    pd.testing.assert_frame_equal(a.test, b.test)


def test_score_joins_on_edge_keys(ex):
    pred = ex.test[["src", "dst"]].copy()
    pred["pred"] = ex.test["label"]  # perfect predictions
    tab = score_edge_predictions(ex.test, pred)
    assert (tab["f1"] == 1.0).all()


def test_score_missing_predictions_count_against_recall(ex):
    pred = ex.test[["src", "dst"]].head(0).copy()
    pred["pred"] = pd.Series(dtype=object)
    tab = score_edge_predictions(ex.test, pred)
    assert (tab["recall"] == 0.0).all()


def test_score_table_has_overall_row(ex):
    pred = ex.test[["src", "dst"]].copy()
    pred["pred"] = ex.test["label"]
    tab = score_edge_predictions(ex.test, pred)
    assert list(tab["type"]) == MAJOR_TYPES + ["overall"]
