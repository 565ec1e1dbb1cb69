"""Tests for Phase II: community matrices, labels, train + distributed
inference."""
import numpy as np
import pandas as pd
import pytest

from repro.core import comm_classify as CC
from repro.core import features as FT
from repro.core.communities import member_features
from repro.oracle import assert_equivalent
from repro.socialnet.generator import MAJOR_TYPES, NetConfig, generate, to_spark


@pytest.fixture(scope="module")
def setup(spark):
    net = generate(NetConfig(n_nodes=250, seed=29))
    edges, inter, users = to_spark(spark, net)
    member_df = member_features(spark, edges, inter).cache()
    member_df.count()
    matrices = CC.community_matrices(member_df, users, k=10).cache()
    matrices.count()
    return net, edges, users, member_df, matrices


def test_matrix_rows_one_per_community(setup):
    net, edges, users, member_df, matrices = setup
    n_comms = member_df.select("ego", "comm_id").distinct().count()
    assert matrices.count() == n_comms


def test_matrix_flat_length(setup):
    *_, matrices = setup
    row = matrices.first()
    assert len(row.matrix) == 10 * FT.MATRIX_WIDTH
    assert len(row.pooled) == 2 * FT.MATRIX_WIDTH


def test_matrix_zero_padding_small_communities(setup):
    *_, matrices = setup
    row = matrices.filter("size = 1").first()
    m = np.array(row.matrix).reshape(10, FT.MATRIX_WIDTH)
    assert (m[1:] == 0).all()
    assert m[0].any()  # the lone member's features are in row 0


def test_community_labels_majority(spark, setup):
    net, edges, users, member_df, matrices = setup
    labeled_edges = spark.createDataFrame(
        net.edges[net.edges["label"].isin(MAJOR_TYPES)]
    )
    labels = CC.community_labels(member_df, labeled_edges).toPandas()
    assert set(labels["label"]).issubset(set(MAJOR_TYPES))
    # oracle: recompute majority vote in SQL (ties broken by label asc)
    assert_equivalent(
        spark.createDataFrame(labels),
        """
        WITH sides AS (
            SELECT src AS ego, dst AS member, label FROM le
            UNION ALL SELECT dst AS ego, src AS member, label FROM le
        ), votes AS (
            SELECT m.ego, m.comm_id, s.label, count(*) AS n
            FROM m JOIN sides s ON s.ego = m.ego AND s.member = m.member
            GROUP BY m.ego, m.comm_id, s.label
        ), ranked AS (
            SELECT ego, comm_id, label,
                   row_number() OVER (PARTITION BY ego, comm_id
                                      ORDER BY n DESC, label ASC) AS rk,
                   sum(n) OVER (PARTITION BY ego, comm_id) AS n_votes
            FROM votes
        )
        SELECT ego, comm_id, label, n_votes FROM ranked WHERE rk = 1
        """,
        le=net.edges[net.edges["label"].isin(MAJOR_TYPES)],
        m=member_df.select("ego", "member", "comm_id").toPandas(),
    )


@pytest.mark.parametrize("variant", ["xgb", "cnn"])
def test_train_and_distributed_inference_agree(spark, setup, variant):
    """mapInPandas inference with broadcast weights must equal a
    driver-side predict."""
    net, edges, users, member_df, matrices = setup
    labeled_edges = spark.createDataFrame(
        net.edges[net.edges["label"].isin(MAJOR_TYPES)]
    )
    labels = CC.community_labels(member_df, labeled_edges)
    labeled = matrices.join(labels, on=["ego", "comm_id"]).toPandas()
    model = CC.train_community_model(
        labeled, variant=variant, k=10, seed=0, cnn_epochs=3, gbdt_rounds=5
    )
    dist = (
        CC.classify_communities(spark, matrices, model, variant=variant, k=10)
        .toPandas()
        .sort_values(["ego", "comm_id"])
        .reset_index(drop=True)
    )
    local_in = matrices.toPandas().sort_values(["ego", "comm_id"]).reset_index(drop=True)
    local = CC._predict_batch(model, variant, local_in, k=10)
    assert np.allclose(
        dist[CC.PROB_COLS].to_numpy(), local[CC.PROB_COLS].to_numpy(), atol=1e-9
    )
    # embeddings agree too (r^C used by Phase III)
    for a, b in zip(dist["emb"], local["emb"]):
        assert np.allclose(np.asarray(a), np.asarray(b), atol=1e-9)


def test_probs_are_distributions(spark, setup):
    net, edges, users, member_df, matrices = setup
    labeled_edges = spark.createDataFrame(
        net.edges[net.edges["label"].isin(MAJOR_TYPES)]
    )
    labels = CC.community_labels(member_df, labeled_edges)
    labeled = matrices.join(labels, on=["ego", "comm_id"]).toPandas()
    model = CC.train_community_model(labeled, variant="xgb", k=10, gbdt_rounds=5)
    out = CC.classify_communities(spark, matrices, model, variant="xgb", k=10).toPandas()
    s = out[CC.PROB_COLS].sum(axis=1)
    assert np.allclose(s, 1.0, atol=1e-6)


def test_label_to_idx_fixed_order():
    assert CC.LABEL_TO_IDX == {"colleague": 0, "family": 1, "schoolmate": 2}
