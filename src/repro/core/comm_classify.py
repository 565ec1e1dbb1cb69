"""Phase II — community classification (paper Sec. IV-B).

Dataflow:

1. :func:`community_matrices` — grouped pandas UDF per (ego, comm_id)
   that assembles Algorithm 1's k×(|I|+|f|) feature matrix (flattened
   to an array column) and the mean/std pooled vector used by the
   XGBoost variant.
2. :func:`community_labels` — ground-truth labels for the communities
   that contain labeled edges: the majority relationship type between
   the ego and the community's labeled members (paper Sec. V-C).
3. :func:`train_community_model` — driver-side training of CommCNN or
   the GBDT on the labeled communities (the paper trains its model
   beforehand on the survey set, then broadcasts it to 100 servers).
4. :func:`classify_communities` — distributed inference via
   mapInPandas with the model weights broadcast to executors; emits
   class probabilities and the Phase III embedding ``r^C`` (softmax
   vector for CommCNN, leaf values for GBDT — paper Sec. IV-C).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core import features as FT
from repro.ml.cnn import CNNConfig, CommCNN
from repro.ml.gbdt import GBDT
from repro.socialnet.generator import MAJOR_TYPES, USER_FEATURES

#: class-index mapping used everywhere (fixed order: colleague, family, schoolmate)
LABEL_TO_IDX = {t: i for i, t in enumerate(MAJOR_TYPES)}
IDX_TO_LABEL = {i: t for t, i in LABEL_TO_IDX.items()}

MATRIX_SCHEMA = (
    "ego long, comm_id int, size int, matrix array<double>, pooled array<double>"
)
PROB_COLS = [f"p_{t}" for t in MAJOR_TYPES]
RESULT_SCHEMA = (
    "ego long, comm_id int, "
    + ", ".join(f"{c} double" for c in PROB_COLS)
    + ", emb array<double>"
)


def community_matrices(
    member_df: DataFrame, users: DataFrame, k: int = 20
) -> DataFrame:
    """One row per local community with its feature matrix + pooled vector."""

    def build(pdf: pd.DataFrame) -> pd.DataFrame:
        mat = FT.build_matrix(pdf, k)
        return pd.DataFrame(
            {
                "ego": [pdf["ego"].iloc[0]],
                "comm_id": [pdf["comm_id"].iloc[0]],
                "size": [len(pdf)],
                "matrix": [mat.ravel().tolist()],
                "pooled": [FT.pooled_vector(pdf).tolist()],
            }
        )

    with_user_feats = member_df.join(
        users.select(F.col("user_id").alias("member"), *USER_FEATURES),
        on="member",
        how="left",
    ).na.fill({c: 0.0 for c in USER_FEATURES})
    return with_user_feats.groupBy("ego", "comm_id").applyInPandas(
        build, schema=MATRIX_SCHEMA
    )


def community_labels(member_df: DataFrame, labeled_edges: DataFrame) -> DataFrame:
    """(ego, comm_id, label) by majority vote of labeled ego↔member edges.

    ``labeled_edges``: (src, dst, label) restricted to the labels the
    experiment is allowed to see (the train split). A community gets a
    label when at least one of its members has a labeled edge to the
    ego; ties break deterministically by label name. ``n_votes`` (the
    total labeled ego↔member edges behind the decision) is carried so
    callers can require a denser vote base — the paper derives
    community ground truth from *surveyed users'* ego networks, where
    most member edges carry labels (Sec. V-C).
    """
    sides = labeled_edges.select(
        F.col("src").alias("ego"), F.col("dst").alias("member"), "label"
    ).unionByName(
        labeled_edges.select(
            F.col("dst").alias("ego"), F.col("src").alias("member"), "label"
        )
    )
    votes = (
        member_df.select("ego", "member", "comm_id")
        .join(sides, on=["ego", "member"])
        .groupBy("ego", "comm_id", "label")
        .agg(F.count("*").alias("n"))
    )
    win = Window.partitionBy("ego", "comm_id").orderBy(F.desc("n"), F.asc("label"))
    total = Window.partitionBy("ego", "comm_id")
    return (
        votes.withColumn("rk", F.row_number().over(win))
        .withColumn("n_votes", F.sum("n").over(total))
        .filter(F.col("rk") == 1)
        .select("ego", "comm_id", "label", "n_votes")
    )


def train_community_model(
    labeled: pd.DataFrame,
    variant: str,
    k: int = 20,
    seed: int = 0,
    cnn_epochs: int = 40,
    gbdt_rounds: int = 40,
):
    """Train the Phase II classifier on collected labeled communities.

    ``labeled`` is a pandas frame with columns matrix, pooled, label
    (strings from MAJOR_TYPES). Returns the fitted model.
    """
    y = labeled["label"].map(LABEL_TO_IDX).to_numpy()
    if variant == "cnn":
        X = np.stack(
            [np.asarray(m).reshape(k, FT.MATRIX_WIDTH) for m in labeled["matrix"]]
        )
        model = CommCNN(
            CNNConfig(k=k, width=FT.MATRIX_WIDTH, n_classes=len(MAJOR_TYPES),
                      epochs=cnn_epochs, seed=seed)
        )
        return model.fit(X, y)
    if variant == "xgb":
        X = np.stack([np.asarray(p) for p in labeled["pooled"]])
        return GBDT(n_classes=len(MAJOR_TYPES), n_rounds=gbdt_rounds).fit(X, y)
    raise ValueError(f"unknown variant {variant!r}")


def _predict_batch(model, variant: str, pdf: pd.DataFrame, k: int) -> pd.DataFrame:
    if variant == "cnn":
        X = np.stack(
            [np.asarray(m).reshape(k, FT.MATRIX_WIDTH) for m in pdf["matrix"]]
        )
        probs = model.predict_proba(X)
        emb = probs  # r^C for CommCNN = softmax vector (paper Sec. IV-C)
    else:
        X = np.stack([np.asarray(p) for p in pdf["pooled"]])
        probs = model.predict_proba(X)
        emb = model.leaf_values(X)  # r^C for XGBoost = leaf values
    out = pd.DataFrame({"ego": pdf["ego"], "comm_id": pdf["comm_id"]})
    for i, c in enumerate(PROB_COLS):
        out[c] = probs[:, i]
    out["emb"] = [row.tolist() for row in emb]
    return out


def classify_communities(
    spark: SparkSession,
    matrices: DataFrame,
    model,
    variant: str,
    k: int = 20,
) -> DataFrame:
    """Distributed Phase II inference with broadcast model weights."""
    params = model.get_params() if variant == "cnn" else model
    bc = spark.sparkContext.broadcast(
        {"variant": variant, "params": params, "k": k}
    )

    def infer(batches):
        b = bc.value
        if b["variant"] == "cnn":
            mdl = CommCNN.from_params(b["params"])
        else:
            mdl = b["params"]  # GBDT pickles whole (pure-python trees)
        for pdf in batches:
            if len(pdf):
                yield _predict_batch(mdl, b["variant"], pdf, b["k"])

    return matrices.mapInPandas(infer, schema=RESULT_SCHEMA)
