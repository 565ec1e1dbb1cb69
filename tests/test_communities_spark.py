"""Tests for the distributed Phase I (+Eq. 1/3) dataflow: the Spark
cogrouped UDF must agree with a driver-side reference implementation."""
import numpy as np
import pandas as pd
import pytest

from repro.core import features as FT
from repro.core.communities import community_sizes, member_features
from repro.core.girvan_newman import girvan_newman
from repro.oracle import assert_equivalent
from repro.socialnet.generator import INTERACTION_DIMS, NetConfig, generate, to_spark


@pytest.fixture(scope="module")
def net():
    return generate(NetConfig(n_nodes=200, seed=23))


@pytest.fixture(scope="module")
def member_pdf(spark, net):
    edges, inter, _ = to_spark(spark, net)
    return member_features(spark, edges, inter).toPandas()


def _reference_ego(net, ego):
    """Driver-side reference: ego network, GN, features for one ego."""
    e = net.edges
    nbrs = sorted(
        set(e.loc[e["src"] == ego, "dst"]) | set(e.loc[e["dst"] == ego, "src"])
    )
    ee = e[e["src"].isin(nbrs) & e["dst"].isin(nbrs)][["src", "dst"]]
    ee = ee.merge(net.interactions, on=["src", "dst"], how="left").fillna(0)
    comm_of = girvan_newman(nbrs, list(zip(ee["src"], ee["dst"])))
    return FT.community_member_features(np.array(nbrs), comm_of, ee)


def test_every_friendship_covered_both_ways(net, member_pdf):
    """Every edge (u,v) must yield member rows (ego=u, v) and (ego=v, u)."""
    pairs = set(zip(member_pdf["ego"], member_pdf["member"]))
    for s, d in zip(net.edges["src"], net.edges["dst"]):
        assert (s, d) in pairs and (d, s) in pairs


def test_member_count_is_twice_edges(net, member_pdf):
    assert len(member_pdf) == 2 * net.n_edges


@pytest.mark.parametrize("ego_rank", [0, 1, 2])
def test_spark_matches_reference(net, member_pdf, ego_rank):
    """Per-ego features from the Spark UDF equal the driver reference."""
    egos = member_pdf["ego"].value_counts().index  # busiest egos first
    ego = int(egos[ego_rank])
    got = (
        member_pdf[member_pdf["ego"] == ego]
        .sort_values("member")
        .reset_index(drop=True)
    )
    ref = _reference_ego(net, ego).sort_values("member").reset_index(drop=True)
    assert got["member"].tolist() == ref["member"].tolist()
    # same community *partition* (ids may be permuted)
    got_part = got.groupby("comm_id")["member"].agg(frozenset)
    ref_part = ref.groupby("comm_id")["member"].agg(frozenset)
    assert set(got_part) == set(ref_part)
    for col in ["tightness"] + FT.X_COLS:
        assert np.allclose(got[col], ref[col], atol=1e-9), col


def test_tightness_bounds(member_pdf):
    assert member_pdf["tightness"].between(0, 1).all()


def test_share_features_bounds(member_pdf):
    for c in FT.X_COLS:
        assert member_pdf[c].between(0, 1 + 1e-9).all(), c


def test_comm_sizes_oracle(spark, member_pdf):
    sizes = community_sizes(
        spark.createDataFrame(member_pdf[["ego", "member", "comm_id"]])
    )
    assert_equivalent(
        sizes,
        "SELECT ego, comm_id, count(*) AS size FROM m GROUP BY ego, comm_id",
        m=member_pdf[["ego", "member", "comm_id"]],
    )


def test_singletons_have_tightness_one(member_pdf):
    singles = member_pdf[member_pdf["comm_size"] == 1]
    assert (singles["tightness"] == 1.0).all()
