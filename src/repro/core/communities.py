"""Phase I + per-member Phase II features, as one Spark dataflow.

The paper's parallel unit is the ego network: "each node is parsed
separately in a streaming scheme in all three phases" (Sec. V-D). We
express that as a cogrouped pandas UDF: for every ego, Spark delivers
(a) the member list and (b) the ego-network edges with their
interaction counters; the UDF runs Girvan–Newman and the Eq. 1 / Eq. 3
feature computation locally and emits one row per (ego, member).

This replaces the GraphX/pregel sketch of the original system — GN is
not a message-passing fixpoint, so the natural Spark formulation is
partitioned per-ego local computation over the triangle-join output
(see DESIGN.md, substitutions).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import features as FT
from repro.core.ego import adjacency, ego_edges
from repro.core.girvan_newman import girvan_newman
from repro.socialnet.generator import INTERACTION_DIMS

#: Output schema of the per-ego UDF (one row per ego-network member).
MEMBER_SCHEMA = (
    "ego long, member long, comm_id int, comm_size int, tightness double, "
    + ", ".join(f"{c} double" for c in FT.X_COLS)
)


def _ego_udf(members: pd.DataFrame, eedges: pd.DataFrame) -> pd.DataFrame:
    """Runs inside an executor for ONE ego network."""
    if len(members) == 0:
        return pd.DataFrame(columns=["ego", "member", "comm_id", "comm_size", "tightness"] + FT.X_COLS)
    ego = int(members["ego"].iloc[0]) if len(members) else int(eedges["ego"].iloc[0])
    nodes = members["member"].to_numpy()
    pairs = list(zip(eedges["src"].to_numpy(), eedges["dst"].to_numpy()))
    comm_of = girvan_newman(list(nodes), pairs)
    feats = FT.community_member_features(nodes, comm_of, eedges)
    feats.insert(0, "ego", ego)
    return feats


def member_features(
    spark: SparkSession, edges: DataFrame, interactions: DataFrame
) -> DataFrame:
    """Distributed Phase I + Eq. 1/3: one row per (ego, member).

    Columns: ego, member, comm_id (per-ego GN community), comm_size,
    tightness, and the 8 Eq.-1 interaction-share features ``x_i_*``.
    Every friend of every node appears exactly once per ego — LoCEC's
    guarantee that *every edge* later receives dense features.
    """
    members = adjacency(edges.select("src", "dst"))
    ee = ego_edges(edges).join(interactions, on=["src", "dst"], how="left").na.fill(
        {c: 0 for c in INTERACTION_DIMS}
    )
    return (
        members.groupBy("ego")
        .cogroup(ee.groupBy("ego"))
        .applyInPandas(_ego_udf, schema=MEMBER_SCHEMA)
    )


def community_sizes(member_df: DataFrame) -> DataFrame:
    """(ego, comm_id, size) for every detected local community."""
    return member_df.groupBy("ego", "comm_id").agg(
        F.count("member").alias("size")
    )
