"""Tests for Phase III: Eq. 4 edge features and the LR edge classifier."""
import numpy as np
import pandas as pd
import pytest

from repro.core import comm_classify as CC
from repro.core import edge_features as EF
from repro.core.communities import member_features
from repro.socialnet.generator import MAJOR_TYPES, NetConfig, generate, to_spark


@pytest.fixture(scope="module")
def setup(spark):
    net = generate(NetConfig(n_nodes=220, seed=31))
    edges, inter, users = to_spark(spark, net)
    member_df = member_features(spark, edges, inter).cache()
    matrices = CC.community_matrices(member_df, users, k=10)
    labeled_edges = spark.createDataFrame(
        net.edges[net.edges["label"].isin(MAJOR_TYPES)]
    )
    labels = CC.community_labels(member_df, labeled_edges)
    labeled = matrices.join(labels, on=["ego", "comm_id"]).toPandas()
    model = CC.train_community_model(labeled, variant="xgb", k=10, gbdt_rounds=5)
    comm_res = CC.classify_communities(spark, matrices, model, variant="xgb", k=10).cache()
    member_res = EF.member_results(member_df, comm_res).cache()
    feats = EF.edge_features(edges, member_res).cache()
    feats.count()
    return net, edges, member_df, member_res, feats


def test_every_edge_has_features(setup):
    """LoCEC's guarantee: the divide-aggregate-combine pipeline gives a
    dense feature vector to EVERY edge (paper Sec. IV-C)."""
    net, edges, member_df, member_res, feats = setup
    assert feats.count() == net.n_edges


def test_feature_vector_width(setup):
    net, edges, member_df, member_res, feats = setup
    emb_len = len(member_res.first().emb)
    row = feats.first()
    assert len(row.features) == 2 + 2 * emb_len  # Eq. 4 layout


def test_eq4_layout_tightness_then_embeddings(setup):
    """features = [tight_u, tight_v, r^{C_u}, r^{C_v}] for one edge."""
    net, edges, member_df, member_res, feats = setup
    r = feats.first()
    mr = member_res.toPandas().set_index(["ego", "member"])
    u_side = mr.loc[(r.dst, r.src)]  # C_u: u's community in v's ego net
    v_side = mr.loc[(r.src, r.dst)]
    f = np.asarray(r.features)
    assert f[0] == pytest.approx(u_side["tightness"])
    assert f[1] == pytest.approx(v_side["tightness"])
    emb_len = len(u_side["emb"])
    assert np.allclose(f[2 : 2 + emb_len], np.asarray(u_side["emb"]))
    assert np.allclose(f[2 + emb_len :], np.asarray(v_side["emb"]))


def test_member_results_join_lossless(setup):
    net, edges, member_df, member_res, feats = setup
    assert member_res.count() == member_df.count()


def test_train_edge_model_and_classify(spark, setup):
    net, edges, member_df, member_res, feats = setup
    train = net.edges[net.edges["label"].isin(MAJOR_TYPES)].sample(
        frac=0.5, random_state=0
    )
    fpdf = feats.join(
        spark.createDataFrame(train), on=["src", "dst"]
    ).toPandas()
    model = EF.train_edge_model(fpdf, epochs=100)
    pred = EF.classify_edges(spark, feats, model).toPandas()
    assert len(pred) == net.n_edges
    assert set(pred["pred"]).issubset(set(MAJOR_TYPES))
    probs = pred[[f"p_{t}" for t in MAJOR_TYPES]].to_numpy()
    assert np.allclose(probs.sum(axis=1), 1.0, atol=1e-6)
    # argmax consistency between probs and pred column
    am = probs.argmax(axis=1)
    assert all(MAJOR_TYPES[i] == p for i, p in zip(am, pred["pred"]))


def test_distributed_lr_matches_driver(spark, setup):
    net, edges, member_df, member_res, feats = setup
    train = net.edges[net.edges["label"].isin(MAJOR_TYPES)].sample(
        frac=0.5, random_state=1
    )
    fpdf = feats.join(spark.createDataFrame(train), on=["src", "dst"]).toPandas()
    model = EF.train_edge_model(fpdf, epochs=50)
    dist = (
        EF.classify_edges(spark, feats, model)
        .toPandas()
        .sort_values(["src", "dst"])
        .reset_index(drop=True)
    )
    local_feats = feats.toPandas().sort_values(["src", "dst"]).reset_index(drop=True)
    X = np.stack([np.asarray(f) for f in local_feats["features"]])
    local_probs = model.predict_proba(X)
    assert np.allclose(
        dist[[f"p_{t}" for t in MAJOR_TYPES]].to_numpy(), local_probs, atol=1e-9
    )
