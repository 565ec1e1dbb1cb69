"""Tests for the ground-truth survey sampler (Table I)."""
import numpy as np
import pytest

from repro.socialnet.generator import ALL_TYPES, NetConfig, generate
from repro.socialnet.survey import (
    PAPER_FIRST_RATIOS,
    SECOND_CATEGORIES,
    SurveyConfig,
    run_survey,
    survey_table,
)


@pytest.fixture(scope="module")
def net():
    return generate(NetConfig(n_nodes=1500, seed=13))


@pytest.fixture(scope="module")
def survey(net):
    return run_survey(net, SurveyConfig(seed=1, n_surveyed=300))


def test_survey_rows_reference_real_edges(net, survey):
    eset = set(zip(net.edges["src"], net.edges["dst"]))
    for u, f in zip(survey["user"], survey["friend"]):
        assert (min(u, f), max(u, f)) in eset


def test_first_categories_valid(survey):
    assert set(survey["first_category"]).issubset(set(ALL_TYPES))


def test_second_categories_match_first(survey):
    for first, grp in survey.groupby("first_category"):
        allowed = set(SECOND_CATEGORIES[first][0])
        assert set(grp["second_category"]).issubset(allowed)


def test_max_friends_cap(net):
    s = run_survey(net, SurveyConfig(seed=1, n_surveyed=300, max_friends_per_user=5))
    assert s.groupby("user").size().max() <= 5


def test_survey_deterministic(net):
    a = run_survey(net, SurveyConfig(seed=4, n_surveyed=100))
    b = run_survey(net, SurveyConfig(seed=4, n_surveyed=100))
    assert a.equals(b)


def test_survey_table_ratios_sum(survey):
    tab = survey_table(survey)
    # second ratios within a first category sum to that category's ratio
    for first, grp in tab.groupby("first_category"):
        assert abs(grp["second_ratio"].sum() - grp["first_ratio"].iloc[0]) < 1e-9
    # and across everything to 1
    assert abs(tab["second_ratio"].sum() - 1.0) < 1e-9


def test_first_ratios_near_paper(survey):
    tab = survey_table(survey).drop_duplicates("first_category")
    for _, r in tab.iterrows():
        assert abs(r["first_ratio"] - PAPER_FIRST_RATIOS[r["first_category"]]) < 0.08


def test_second_category_conditionals_normalized():
    for first, (names, probs) in SECOND_CATEGORIES.items():
        assert len(names) == len(probs)
        assert abs(sum(probs) / sum(probs) - 1.0) < 1e-9  # normalizable
        assert all(p >= 0 for p in probs)


def test_survey_empty_safe():
    tab = survey_table(run_survey(generate(NetConfig(n_nodes=30, seed=2)),
                                  SurveyConfig(seed=1, n_surveyed=1)))
    assert (tab["second_ratio"] >= 0).all()
