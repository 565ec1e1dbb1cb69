"""End-to-end LoCEC (paper Algorithm 2) with per-phase timing.

``run_locec`` wires the three phases over Spark DataFrames:

- Phase I  (*division*):    ego networks + Girvan–Newman communities,
- Phase II (*aggregation*): community feature matrices + CommCNN/GBDT,
- Phase III (*combination*): Eq. 4 edge features + logistic regression,

forcing materialization at each phase boundary so the wall-clock split
reported for Table VI attributes time to the right phase, the same way
the paper reports per-phase running hours.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import comm_classify as CC
from repro.core import edge_features as EF
from repro.core.communities import member_features


@dataclass
class LocecResult:
    """Artifacts of one end-to-end run (cached Spark frames + models)."""

    member_df: DataFrame
    matrices: DataFrame
    comm_results: DataFrame
    edge_pred: DataFrame
    comm_model: object
    edge_model: object
    timings: dict = field(default_factory=dict)  # seconds per phase
    train_time: float = 0.0


def run_locec(
    spark: SparkSession,
    edges: DataFrame,
    interactions: DataFrame,
    users: DataFrame,
    train_edges: DataFrame,
    variant: str = "cnn",
    k: int = 20,
    seed: int = 0,
    cnn_epochs: int = 40,
    gbdt_rounds: int = 40,
    lr_epochs: int = 300,
) -> LocecResult:
    """Run LoCEC over the whole network.

    ``train_edges`` — (src, dst, label) the *visible* labeled edges
    (the paper's survey set / the train split). They drive both the
    Phase II community labels and the Phase III LR fit; inference
    covers every edge of the network.

    ``variant`` — "cnn" (LoCEC-CNN) or "xgb" (LoCEC-XGB).
    """
    timings: dict = {}

    # ---- Phase I: division -----------------------------------------
    t0 = time.perf_counter()
    member_df = member_features(spark, edges, interactions).cache()
    member_df.count()
    timings["phase1"] = time.perf_counter() - t0

    # ---- Phase II: aggregation -------------------------------------
    t0 = time.perf_counter()
    matrices = CC.community_matrices(member_df, users, k=k).cache()
    matrices.count()
    labels = CC.community_labels(member_df, train_edges)
    labeled = matrices.join(labels, on=["ego", "comm_id"]).toPandas()

    t_train0 = time.perf_counter()
    comm_model = CC.train_community_model(
        labeled, variant=variant, k=k, seed=seed,
        cnn_epochs=cnn_epochs, gbdt_rounds=gbdt_rounds,
    )
    train_time = time.perf_counter() - t_train0

    comm_results = CC.classify_communities(
        spark, matrices, comm_model, variant=variant, k=k
    ).cache()
    comm_results.count()
    # model training is reported separately (paper Table VI "Training")
    timings["phase2"] = time.perf_counter() - t0 - train_time

    # ---- Phase III: combination ------------------------------------
    t0 = time.perf_counter()
    member_res = EF.member_results(member_df, comm_results)
    feats = EF.edge_features(edges, member_res).cache()
    feats.count()

    t_train0 = time.perf_counter()
    train_feats = feats.join(train_edges, on=["src", "dst"]).toPandas()
    edge_model = EF.train_edge_model(train_feats, seed=seed, epochs=lr_epochs)
    lr_train = time.perf_counter() - t_train0
    train_time += lr_train

    edge_pred = EF.classify_edges(spark, feats, edge_model).cache()
    edge_pred.count()
    timings["phase3"] = time.perf_counter() - t0 - lr_train
    timings["total"] = timings["phase1"] + timings["phase2"] + timings["phase3"]

    return LocecResult(
        member_df=member_df,
        matrices=matrices,
        comm_results=comm_results,
        edge_pred=edge_pred,
        comm_model=comm_model,
        edge_model=edge_model,
        timings=timings,
        train_time=train_time,
    )
