"""Phase II feature computation: Eq. 1 (interact), Eq. 3 (tightness),
and Algorithm 1 (community feature-matrix construction).

These are pure pandas/numpy functions over ONE ego network. The Spark
layer (``repro.core.communities`` / ``repro.core.comm_classify``) calls
them inside grouped pandas UDFs; tests call them directly on small
hand-built networks.

Interpretation note (Eq. 1): the paper's denominator is written
``Σ_{v∈C} I^j_vw`` with ``w`` undeclared. We read it as the total
interaction volume on dimension ``j`` over all member pairs inside the
community, which normalizes ``interact(u, C, j)`` into a per-community
share in [0, 1] — consistent with the text "evaluates how this friend
interacts with all members in the same local community". A community
with zero volume on a dimension yields 0 for every member.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.socialnet.generator import INTERACTION_DIMS, USER_FEATURES

#: Eq.-1 feature column names (one per interaction dimension).
X_COLS = [f"x_{c}" for c in INTERACTION_DIMS]
#: Width of the community feature matrix: |I| + |f|.
MATRIX_WIDTH = len(INTERACTION_DIMS) + len(USER_FEATURES)


def community_member_features(
    members: np.ndarray,
    comm_of: dict,
    ego_edges: pd.DataFrame,
) -> pd.DataFrame:
    """Per-member Eq. 1 features and Eq. 3 tightness for one ego network.

    ``members``: all friends in the ego network (isolated ones included).
    ``comm_of``: {member: community id} from Girvan–Newman.
    ``ego_edges``: columns src, dst plus the 8 ``i_*`` interaction
    counters for edges *among the friends* (the ego's own incident
    edges are excluded, per Phase I).

    Returns one row per member: comm_id, comm_size, tightness, x_*.
    """
    members = np.asarray(members)
    comm_ids = np.array([comm_of[u] for u in members])
    # degree inside the ego network: friend(u, G_v)
    deg_ego = pd.concat([ego_edges["src"], ego_edges["dst"]]).value_counts().to_dict()
    # same-community edge mask
    e_src_comm = ego_edges["src"].map(comm_of)
    e_dst_comm = ego_edges["dst"].map(comm_of)
    same = (e_src_comm == e_dst_comm).to_numpy()
    intra = ego_edges[same]
    intra_comm = e_src_comm[same].to_numpy()

    # friend(u, C): degree restricted to same-community edges
    deg_comm = pd.concat([intra["src"], intra["dst"]]).value_counts().to_dict()

    # Eq. 1 numerator: per member, per dim, sum of interactions on
    # intra-community edges incident to the member
    num = {u: np.zeros(len(INTERACTION_DIMS)) for u in members}
    ivals = intra[INTERACTION_DIMS].to_numpy(dtype=float) if len(intra) else np.zeros((0, len(INTERACTION_DIMS)))
    for row, s, d in zip(ivals, intra["src"].to_numpy(), intra["dst"].to_numpy()):
        num[s] += row
        num[d] += row
    # Eq. 1 denominator: total volume per dim inside each community
    denom_by_comm: dict = {}
    for cid in set(comm_ids):
        mask = intra_comm == cid
        denom_by_comm[cid] = ivals[mask].sum(axis=0) if mask.any() else np.zeros(len(INTERACTION_DIMS))

    sizes = pd.Series(comm_ids).value_counts()
    rows = []
    for u, cid in zip(members, comm_ids):
        size = int(sizes[cid])
        fc = float(deg_comm.get(u, 0))
        fe = float(deg_ego.get(u, 0))
        if size == 1:
            tight = 1.0  # Eq. 3 special case
        else:
            tight = (fc / fe if fe else 0.0) * (fc / (size - 1))
        denom = denom_by_comm[cid]
        with np.errstate(invalid="ignore", divide="ignore"):
            x = np.where(denom > 0, num[u] / denom, 0.0)
        rows.append(
            {"member": u, "comm_id": int(cid), "comm_size": size,
             "tightness": float(tight),
             **{c: float(v) for c, v in zip(X_COLS, x)}}
        )
    return pd.DataFrame(rows)


def build_matrix(comm_feats: pd.DataFrame, k: int) -> np.ndarray:
    """Algorithm 1: the k×(|I|+|f|) feature matrix of one community.

    ``comm_feats`` holds one row per community member with the Eq. 1
    features (x_*), the user's individual features (f_*), and
    ``tightness``. Members are sorted by descending tightness (ties
    broken by member id for determinism — the paper's max-heap pop
    order); the top k rows [I_u^C, f_u] form the matrix, zero-padded
    when the community is smaller than k.
    """
    cols = X_COLS + USER_FEATURES
    df = comm_feats.sort_values(
        ["tightness", "member"], ascending=[False, True], kind="stable"
    ).head(k)
    mat = np.zeros((k, len(cols)))
    vals = df[cols].to_numpy(dtype=float)
    mat[: len(vals)] = vals
    return mat


def pooled_vector(comm_feats: pd.DataFrame) -> np.ndarray:
    """Mean/std pooling of member features (the LoCEC-XGB community
    representation — paper Sec. IV-B.2: "the mean and standard deviation
    of each feature dimension regarding all nodes in a local community")."""
    cols = X_COLS + USER_FEATURES
    vals = comm_feats[cols].to_numpy(dtype=float)
    return np.concatenate([vals.mean(axis=0), vals.std(axis=0)])
