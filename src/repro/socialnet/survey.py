"""Ground-truth survey sampling (paper Table I).

The paper pays 8,805 users to label 431,409 relationships with a first
category (family / colleague / schoolmate / other) and, optionally, a
second category. We reproduce the instrument: sample surveyed users,
sample labeled friends per user, attach second categories with the
paper's conditional frequencies (respecting that users sometimes leave
the second category "unknown" out of privacy concern).

The *first*-category ratios come out of the planted network itself —
matching them to Table I is a property of the generator calibration,
which ``jobs/table1_survey.py`` reports side by side with the paper.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.socialnet.generator import (
    COLLEAGUE,
    FAMILY,
    OTHER,
    SCHOOLMATE,
    SocialNetwork,
)

# Second-category conditional distributions, normalized from Table I's
# within-category percentages (e.g. colleague: current 14 / past 25 /
# unknown 3 out of 41-42%).
SECOND_CATEGORIES = {
    FAMILY: (["next_of_kin", "kin", "in_law", "unknown"], [0.004, 0.57, 0.18, 0.246]),
    COLLEAGUE: (["current", "past", "unknown"], [0.333, 0.595, 0.072]),
    SCHOOLMATE: (
        ["primary", "middle", "university", "graduate", "unknown"],
        [0.133, 0.267, 0.533, 0.004, 0.063],
    ),
    OTHER: (
        ["interest", "business", "agent", "private", "unknown"],
        [0.5625, 0.0625, 0.0625, 0.004, 0.3085],
    ),
}

# Paper Table I first-category ratios, for side-by-side reporting.
PAPER_FIRST_RATIOS = {FAMILY: 0.28, COLLEAGUE: 0.41, SCHOOLMATE: 0.15, OTHER: 0.16}


@dataclass
class SurveyConfig:
    seed: int = 13
    n_surveyed: int = 200
    max_friends_per_user: int = 60


def run_survey(net: SocialNetwork, cfg: SurveyConfig | None = None) -> pd.DataFrame:
    """Sample surveyed relationships: (user, friend, first, second)."""
    cfg = cfg or SurveyConfig()
    g = np.random.default_rng(cfg.seed)
    surveyed = g.choice(net.n_nodes, size=min(cfg.n_surveyed, net.n_nodes), replace=False)
    # adjacency (both directions) restricted to surveyed users
    fwd = net.edges.rename(columns={"src": "user", "dst": "friend"})
    bwd = net.edges.rename(columns={"dst": "user", "src": "friend"})
    adj = pd.concat([fwd, bwd], ignore_index=True)
    adj = adj[adj["user"].isin(surveyed)]
    # cap friends per user (survey effort limit)
    adj = (
        adj.sample(frac=1.0, random_state=cfg.seed)
        .groupby("user", sort=False)
        .head(cfg.max_friends_per_user)
        .reset_index(drop=True)
    )
    seconds = []
    for first in adj["label"]:
        names, probs = SECOND_CATEGORIES[first]
        p = np.asarray(probs, dtype=float)
        seconds.append(g.choice(names, p=p / p.sum()))
    out = adj.rename(columns={"label": "first_category"})
    out["second_category"] = seconds
    return out[["user", "friend", "first_category", "second_category"]]


def survey_table(survey: pd.DataFrame) -> pd.DataFrame:
    """Reproduce Table I: first/second category ratios over the survey."""
    n = len(survey)
    rows = []
    for first in (FAMILY, COLLEAGUE, SCHOOLMATE, OTHER):
        sub = survey[survey["first_category"] == first]
        first_ratio = len(sub) / n if n else 0.0
        for second in SECOND_CATEGORIES[first][0]:
            rows.append(
                {
                    "first_category": first,
                    "first_ratio": first_ratio,
                    "second_category": second,
                    "second_ratio": (sub["second_category"] == second).sum() / n if n else 0.0,
                }
            )
    return pd.DataFrame(rows)
