"""Phase III — edge labeling (paper Sec. IV-C, Eq. 4).

For edge <u, v>: ``C_u`` is u's local community inside *v's* ego
network and ``C_v`` is v's community inside *u's* ego network. The
edge feature vector is

    f_<u,v> = [tightness(u, C_u), tightness(v, C_v), r^{C_u}, r^{C_v}]

assembled here with two joins of the per-member Phase II results onto
the canonical edge list, then classified by a multinomial logistic
regression trained on the labeled edges (driver-side fit, distributed
inference via mapInPandas + broadcast weights).

The divide–aggregate–combine guarantee holds by construction: every
edge endpoint is a member of the other endpoint's ego network, so the
joins below are never lossy and every edge gets a dense feature vector.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.comm_classify import IDX_TO_LABEL, PROB_COLS
from repro.ml.logreg import LogisticRegression
from repro.socialnet.generator import MAJOR_TYPES

EDGE_FEATURE_SCHEMA = "src long, dst long, features array<double>"
EDGE_PRED_SCHEMA = (
    "src long, dst long, "
    + ", ".join(f"{c} double" for c in PROB_COLS)
    + ", pred string"
)


def member_results(member_df: DataFrame, comm_results: DataFrame) -> DataFrame:
    """(ego, member, tightness, emb): each member's tightness and the
    embedding of the community it belongs to, per ego network."""
    return member_df.select("ego", "member", "comm_id", "tightness").join(
        comm_results.select("ego", "comm_id", "emb"), on=["ego", "comm_id"]
    )


def edge_features(edges: DataFrame, member_res: DataFrame) -> DataFrame:
    """Eq. 4 features for every edge (src, dst): joins both orientations.

    Side u: (ego = dst, member = src) → tightness(u, C_u), r^{C_u};
    side v: (ego = src, member = dst) → tightness(v, C_v), r^{C_v}.
    """
    u_side = member_res.select(
        F.col("ego").alias("dst"),
        F.col("member").alias("src"),
        F.col("tightness").alias("tight_u"),
        F.col("emb").alias("emb_u"),
    )
    v_side = member_res.select(
        F.col("ego").alias("src"),
        F.col("member").alias("dst"),
        F.col("tightness").alias("tight_v"),
        F.col("emb").alias("emb_v"),
    )
    joined = (
        edges.select("src", "dst")
        .join(u_side, on=["src", "dst"])
        .join(v_side, on=["src", "dst"])
    )
    return joined.select(
        "src",
        "dst",
        F.concat(
            F.array("tight_u", "tight_v"), F.col("emb_u"), F.col("emb_v")
        ).alias("features"),
    )


def train_edge_model(
    feat_pdf: pd.DataFrame, seed: int = 0, epochs: int = 300
) -> LogisticRegression:
    """Fit the Phase III LR on collected labeled-edge features.

    ``feat_pdf``: columns features (list<double>) and label (strings
    from MAJOR_TYPES).
    """
    X = np.stack([np.asarray(f) for f in feat_pdf["features"]])
    y = feat_pdf["label"].map({t: i for i, t in enumerate(MAJOR_TYPES)}).to_numpy()
    return LogisticRegression(n_classes=len(MAJOR_TYPES), seed=seed, epochs=epochs).fit(X, y)


def classify_edges(
    spark: SparkSession, feats: DataFrame, model: LogisticRegression
) -> DataFrame:
    """Distributed Phase III inference: (src, dst, p_*, pred)."""
    bc = spark.sparkContext.broadcast(model.get_params())

    def infer(batches):
        mdl = LogisticRegression.from_params(bc.value)
        for pdf in batches:
            if not len(pdf):
                continue
            X = np.stack([np.asarray(f) for f in pdf["features"]])
            probs = mdl.predict_proba(X)
            out = pd.DataFrame({"src": pdf["src"], "dst": pdf["dst"]})
            for i, c in enumerate(PROB_COLS):
                out[c] = probs[:, i]
            out["pred"] = [IDX_TO_LABEL[i] for i in probs.argmax(axis=1)]
            yield out

    return feats.mapInPandas(infer, schema=EDGE_PRED_SCHEMA)
