"""Vector matching filter (VMF) — §2.2, Definition 2.1.

Per SF-group: apply the *n*-ary db-agnostic encoding (§4.2.2), embed
every subexpression with the EMF's trained tree-convolution stack
(eval mode), index the embeddings in an HNSW graph, and emit pairs
within Euclidean radius τ as likely-equivalent candidates.

Driver-side (`VMF.candidate_pairs`) and Spark (`vmf_candidates_spark`,
one `applyInPandas` task per SF-group) implementations share the same
core, so results agree.
"""
from __future__ import annotations

import numpy as np

from repro.ann.hnsw import HNSW
from repro.core.plan import Plan, from_json
from repro.encoding.agnostic import DEFAULT_SPACE, AgnosticSpace, encode_group_agnostic
from repro.encoding.canonical_form import canonical_plan
from repro.filters.schema_filter import sf_groups
from repro.nn.model import EMF
from repro.nn.train import pad_encs

DEFAULT_TAU = 1.0  # paper: FAISS radius d = 1 (§7 Implementation)


def embed_group(
    model: EMF, plans: list[Plan], space: AgnosticSpace = DEFAULT_SPACE
) -> np.ndarray:
    """(n, h) embeddings of one SF-group under the group-wise n-ary
    db-agnostic encoding."""
    canon = [canonical_plan(p) for p in plans]
    encs = encode_group_agnostic(canon, space)
    X, L, R, mask = pad_encs(encs)
    return model.embed_eval(X, L, R, mask)


def group_candidate_pairs(
    model: EMF,
    plans: list[Plan],
    *,
    tau: float = DEFAULT_TAU,
    space: AgnosticSpace = DEFAULT_SPACE,
    seed: int = 0,
) -> set[tuple[int, int]]:
    """Candidate pairs (local indices, i < j) within one SF-group."""
    n = len(plans)
    if n < 2:
        return set()
    Z = embed_group(model, plans, space)
    index = HNSW(Z.shape[1], seed=seed).build(Z)
    ef = max(64, min(n, 512))
    out: set[tuple[int, int]] = set()
    for i in range(n):
        for j in index.radius_search(Z[i], tau, ef=ef):
            if j != i:
                out.add((min(i, j), max(i, j)))
    return out


def calibrate_tau(
    model: EMF,
    positive_pairs: list[tuple[Plan, Plan]],
    *,
    target_recall: float = 0.98,
    space: AgnosticSpace = DEFAULT_SPACE,
) -> float:
    """Pick τ as the ``target_recall`` quantile of positive-pair
    embedding distances — the VMF must admit (nearly) all equivalences
    (§1: "ensure that equivalence pairs are admitted with high recall").
    """
    dists = []
    for p1, p2 in positive_pairs:
        try:
            Z = embed_group(
                model, [canonical_plan(p1), canonical_plan(p2)], space
            )
        except ValueError:
            continue
        dists.append(float(np.linalg.norm(Z[0] - Z[1])))
    if not dists:
        return DEFAULT_TAU
    tau = float(np.quantile(dists, target_recall))
    return max(tau, 1e-3)  # equivalent pairs often embed identically


class VMF:
    """Stateful wrapper holding the embedding model and threshold."""

    def __init__(self, model: EMF, *, tau: float = DEFAULT_TAU,
                 space: AgnosticSpace = DEFAULT_SPACE):
        self.model = model
        self.tau = tau
        self.space = space

    def candidate_pairs(self, plans: list[Plan]) -> set[tuple[int, int]]:
        """SF-group-wise candidates over a whole workload (global ids)."""
        out: set[tuple[int, int]] = set()
        for key, idxs in sf_groups(plans).items():
            local = [plans[i] for i in idxs]
            try:
                pairs = group_candidate_pairs(
                    self.model, local, tau=self.tau, space=self.space
                )
            except ValueError:
                # group exceeds the agnostic space: pass everything
                # through (the filter must not drop true equivalences)
                pairs = {
                    (a, b)
                    for a in range(len(local))
                    for b in range(a + 1, len(local))
                }
            for a, b in pairs:
                i, j = idxs[a], idxs[b]
                out.add((min(i, j), max(i, j)))
        return out

    def pair_distance(self, p1: Plan, p2: Plan) -> float:
        """Pairwise embedding distance (the ``≈_VMF`` predicate)."""
        Z = embed_group(self.model, [canonical_plan(p1), canonical_plan(p2)],
                        self.space)
        return float(np.linalg.norm(Z[0] - Z[1]))

    def pair_pass(self, p1: Plan, p2: Plan) -> bool:
        try:
            return self.pair_distance(p1, p2) < self.tau
        except ValueError:
            return True


def vmf_candidates_spark(
    workload_df,
    model: EMF,
    *,
    tau: float = DEFAULT_TAU,
):
    """Spark VMF: one `applyInPandas` task per SF-group.

    ``workload_df`` is (id, plan, sf_key) from
    :func:`repro.filters.schema_filter.workload_to_df`; the model weights
    ship to workers via broadcast. Returns a DataFrame (id1, id2).
    """
    import pandas as pd

    spark = workload_df.sparkSession
    weights = spark.sparkContext.broadcast(model.to_bytes())
    tau_b = float(tau)

    def per_group(pdf: pd.DataFrame) -> pd.DataFrame:
        model = EMF.from_bytes(weights.value)
        plans = [from_json(s) for s in pdf["plan"]]
        ids = pdf["id"].to_numpy()
        try:
            pairs = group_candidate_pairs(model, plans, tau=tau_b)
        except ValueError:
            pairs = {
                (a, b) for a in range(len(plans)) for b in range(a + 1, len(plans))
            }
        rows = [
            (int(min(ids[a], ids[b])), int(max(ids[a], ids[b])))
            for a, b in pairs
        ]
        return pd.DataFrame(rows, columns=["id1", "id2"])

    return workload_df.groupBy("sf_key").applyInPandas(
        per_group, schema="id1 long, id2 long"
    )
