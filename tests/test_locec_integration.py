"""End-to-end integration tests of Algorithm 2 (both variants)."""
import numpy as np
import pytest

from repro.core.experiment import make_experiment, score_edge_predictions
from repro.core.locec import run_locec
from repro.socialnet.generator import MAJOR_TYPES


@pytest.fixture(scope="module")
def ex(spark):
    return make_experiment(spark, n_nodes=350, seed=7)


@pytest.fixture(scope="module")
def result_xgb(spark, ex):
    return run_locec(
        spark, ex.edges, ex.interactions, ex.users, ex.train_df(spark),
        variant="xgb", gbdt_rounds=20, lr_epochs=150,
    )


@pytest.fixture(scope="module")
def result_cnn(spark, ex):
    return run_locec(
        spark, ex.edges, ex.interactions, ex.users, ex.train_df(spark),
        variant="cnn", cnn_epochs=12, lr_epochs=150,
    )


def test_all_edges_predicted(ex, result_xgb):
    assert result_xgb.edge_pred.count() == ex.net.n_edges


def test_predictions_are_major_types(result_xgb):
    preds = {r.pred for r in result_xgb.edge_pred.select("pred").distinct().collect()}
    assert preds.issubset(set(MAJOR_TYPES))


def test_timings_recorded(result_xgb):
    t = result_xgb.timings
    assert set(t) == {"phase1", "phase2", "phase3", "total"}
    assert all(v > 0 for v in t.values())
    assert t["total"] == pytest.approx(t["phase1"] + t["phase2"] + t["phase3"])


def test_xgb_beats_chance_clearly(ex, result_xgb):
    tab = score_edge_predictions(ex.test, result_xgb.edge_pred.toPandas())
    overall = tab[tab["type"] == "overall"].iloc[0]
    assert overall["f1"] > 0.6  # way above the ~0.33 chance level


def test_cnn_beats_chance_clearly(ex, result_cnn):
    tab = score_edge_predictions(ex.test, result_cnn.edge_pred.toPandas())
    overall = tab[tab["type"] == "overall"].iloc[0]
    assert overall["f1"] > 0.55  # few epochs at tiny scale — floor only


def test_variants_share_phase1(result_xgb, result_cnn):
    """Phase I is variant-independent: identical member partitions."""
    a = result_xgb.member_df.toPandas().sort_values(["ego", "member"])
    b = result_cnn.member_df.toPandas().sort_values(["ego", "member"])
    assert np.array_equal(a["comm_id"].to_numpy(), b["comm_id"].to_numpy())


def test_embedding_kinds_differ(result_xgb, result_cnn):
    """r^C is leaf values for XGB (high-dim) vs softmax (|L|) for CNN."""
    xgb_emb = len(result_xgb.comm_results.first().emb)
    cnn_emb = len(result_cnn.comm_results.first().emb)
    assert cnn_emb == len(MAJOR_TYPES)
    assert xgb_emb > cnn_emb


def test_probability_columns_valid(result_cnn):
    pdf = result_cnn.edge_pred.toPandas()
    probs = pdf[[f"p_{t}" for t in MAJOR_TYPES]].to_numpy()
    assert np.allclose(probs.sum(axis=1), 1.0, atol=1e-6)
