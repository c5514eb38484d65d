"""RelatedQS and LP hybrid-query workloads (S12).

RelatedQS-lite follows §2.1 / Table 1: ten predicate templates with
fixed per-split occurrence shares (filter commonality + stability) and
selectivities spanning ~0.05%–60%. Four temporal splits t0–t3 use the
per-split share columns of Table 1. Each query's vector is the
embedding of a random entity satisfying the template — this encodes the
paper's predicate↔vector correlation (the query entity of "How tall is
Taylor Swift?" is itself a person with a height).

LP-lite models the link-prediction workload: the attribute constraint
is a single equality on the entity type, there is no historical query
log (so HQI falls back to a workload-oblivious layout and only the
batching optimization applies — §6.2).
"""
from __future__ import annotations

import numpy as np

from repro.core.predicates import Cmp, Conjunction, In, NotNull
from repro.core.types import Dataset, Workload

# Table 1 template shares per temporal split t0..t3 (columns), T1..T10
# (rows). "<1%" entries are taken as 0.9%; each column is normalized.
TABLE1_SHARES = np.array(
    [
        [15, 17, 17, 18],  # T1
        [26, 26, 26, 26],  # T2
        [0.9, 0.9, 0.9, 0.9],  # T3
        [24, 20, 20, 20],  # T4
        [11, 12, 11, 12],  # T5
        [2, 2, 2, 2],  # T6
        [3, 3, 4, 3],  # T7
        [15, 15, 15, 14],  # T8
        [0.9, 0.9, 0.9, 0.9],  # T9
        [4, 4, 4, 4],  # T10
    ],
    dtype=float,
)

# Paper's "% feasible KG entities" upper bounds per template (Table 1).
TABLE1_SELECTIVITY_BOUNDS = [
    5e-5, 1e-3, 1e-3, 5e-3, 5e-3, 1e-2, 2.5e-2, 0.30, 0.58, 0.60,
]


def relatedqs_templates() -> dict[int, Conjunction]:
    """T1..T10 (ids 1..10), ordered lowest to highest selectivity as in
    Table 1. Templates mix equality, IN, and IS NOT NULL predicates over
    multiple attributes — the reason Strategy C (Range) is inapplicable."""
    return {
        1: Conjunction([Cmp("etype", "=", "person"), NotNull("nobel")]),
        2: Conjunction([Cmp("etype", "=", "team"), NotNull("stadium")]),
        3: Conjunction([Cmp("etype", "=", "artist"), NotNull("grammy")]),
        4: Conjunction([Cmp("etype", "=", "person"), NotNull("height")]),
        5: Conjunction([Cmp("etype", "=", "city"), NotNull("population")]),
        6: Conjunction([Cmp("etype", "=", "film"), NotNull("runtime")]),
        7: Conjunction([Cmp("etype", "=", "person"), NotNull("birth_year")]),
        8: Conjunction([In("etype", ["song", "company"])]),
        9: Conjunction([NotNull("popularity")]),
        10: Conjunction([In("etype", ["song", "album", "misc", "book", "event"])]),
    }


def _sample_queries(
    dataset: Dataset,
    templates: dict[int, Conjunction],
    tids: np.ndarray,
    rng: np.random.Generator,
    qid_offset: int,
) -> Workload:
    pdf = dataset.pdf
    vecs = dataset.vecs()
    sat_rows = {
        t: np.flatnonzero(conj.mask(pdf)) for t, conj in templates.items()
    }
    qvecs = np.empty((len(tids), vecs.shape[1]))
    for i, t in enumerate(tids):
        rows = sat_rows[int(t)]
        qvecs[i] = vecs[rng.choice(rows)]
    return Workload(
        templates=templates,
        qids=np.arange(qid_offset, qid_offset + len(tids), dtype=np.int64),
        qvecs=qvecs,
        qtemplates=np.asarray(tids, dtype=np.int64),
    )


def relatedqs_workload(
    dataset: Dataset,
    *,
    n_queries_per_split: int,
    seed: int = 0,
) -> list[Workload]:
    """The four temporal splits t0..t3, sharing one template dict."""
    rng = np.random.default_rng(seed)
    templates = relatedqs_templates()
    splits = []
    for s in range(TABLE1_SHARES.shape[1]):
        shares = TABLE1_SHARES[:, s] / TABLE1_SHARES[:, s].sum()
        tids = rng.choice(
            np.arange(1, 11), size=n_queries_per_split, p=shares
        )
        splits.append(
            _sample_queries(
                dataset, templates, tids, rng, qid_offset=s * n_queries_per_split
            )
        )
    return splits


def lp_workload(dataset: Dataset, *, n_queries: int, seed: int = 0) -> Workload:
    """Link prediction: query entity sampled uniformly; the constraint is
    an equality on the *target* entity type, drawn from the population
    shares (imputing e.g. "collaborator" facts targets type Artist)."""
    rng = np.random.default_rng(seed)
    pdf = dataset.pdf
    types = sorted(pdf["etype"].unique())
    templates = {
        i + 1: Conjunction([Cmp("etype", "=", t)]) for i, t in enumerate(types)
    }
    counts = pdf["etype"].value_counts(normalize=True)
    probs = np.array([counts[t] for t in types])
    tids = rng.choice(np.arange(1, len(types) + 1), size=n_queries, p=probs)
    qrows = rng.integers(0, len(pdf), size=n_queries)
    return Workload(
        templates=templates,
        qids=np.arange(n_queries, dtype=np.int64),
        qvecs=dataset.vecs()[qrows],
        qtemplates=tids.astype(np.int64),
    )
