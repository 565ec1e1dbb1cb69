"""Tests for chat-group simulation and rule-based name mining (Table II)."""
import pandas as pd
import pytest

from repro.socialnet.generator import COLLEAGUE, FAMILY, SCHOOLMATE, NetConfig, generate
from repro.socialnet.groups import (
    GroupConfig,
    classify_name,
    group_name_table,
    make_groups,
    rule_mine_pairs,
)


@pytest.fixture(scope="module")
def net():
    return generate(NetConfig(n_nodes=1500, seed=11))


@pytest.fixture(scope="module")
def groups(net):
    return make_groups(net, GroupConfig(seed=2))


@pytest.mark.parametrize(
    "name,expect",
    [
        ("Zhang Family Group", FAMILY),
        ("happy family", FAMILY),
        ("Sales Department Acme Company", COLLEAGUE),
        ("R&D Department", COLLEAGUE),
        ("Class 3 Hilltop Middle School", SCHOOLMATE),
        ("Peking University alumni", SCHOOLMATE),
        ("Weekend Hiking", None),
        ("Besties", None),
        ("", None),
    ],
)
def test_classify_name(name, expect):
    assert classify_name(name) == expect


def test_groups_have_members(groups):
    sizes = groups.groupby("group_id").size()
    assert (sizes >= 2).all()


def test_groups_deterministic(net):
    a = make_groups(net, GroupConfig(seed=2))
    b = make_groups(net, GroupConfig(seed=2))
    pd.testing.assert_frame_equal(a, b)


def test_most_groups_have_generic_names(groups):
    names = groups.drop_duplicates("group_id")["name"]
    indicative = names.map(lambda s: classify_name(s) is not None).mean()
    assert indicative < 0.10


def test_some_pairs_share_no_group(net, groups):
    """Paper: ~20% of friend pairs are not in any common group."""
    member_sets = groups.groupby("group_id")["user_id"].agg(set)
    pair_in_group = set()
    for s in member_sets:
        for u in s:
            for v in s:
                if u < v:
                    pair_in_group.add((u, v))
    pairs = list(zip(net.edges["src"], net.edges["dst"]))
    missing = sum(1 for p in pairs if p not in pair_in_group) / len(pairs)
    assert missing > 0.10


def test_rule_mine_pairs_columns(groups):
    preds = rule_mine_pairs(groups)
    assert list(preds.columns) == ["src", "dst", "pred"]
    if len(preds):
        assert (preds["src"] < preds["dst"]).all()
        assert not preds.duplicated(["src", "dst"]).any()


def test_rule_mining_no_indicative_names():
    g = pd.DataFrame(
        {"group_id": [0, 0], "name": ["Weekend Hiking"] * 2,
         "ctype": [FAMILY] * 2, "user_id": [1, 2]}
    )
    assert len(rule_mine_pairs(g)) == 0


def test_table2_regime(net):
    """High precision, near-zero recall — the paper's Table II shape."""
    tab = group_name_table(net, GroupConfig(seed=2))
    assert set(tab["type"]) == {FAMILY, COLLEAGUE, SCHOOLMATE}
    for _, row in tab.iterrows():
        if row["recall"] > 0:  # a rule fired for this type
            assert row["precision"] > 0.5, row
            assert row["recall"] < 0.10, row


def test_table2_f1_consistent(net):
    tab = group_name_table(net, GroupConfig(seed=2))
    for _, r in tab.iterrows():
        if r["precision"] + r["recall"] > 0:
            f1 = 2 * r["precision"] * r["recall"] / (r["precision"] + r["recall"])
            assert abs(f1 - r["f1"]) < 1e-9
