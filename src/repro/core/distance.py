"""Batched distance kernels and top-k selection.

The paper uses two metrics (Table 2): L2 for SIFT/MSTuring and inner
product (IP) for YandexT2I and the KG workloads. We normalize both to an
ascending-better *score*:

- ``l2``: squared Euclidean distance (monotone in L2, and exact in
  float64 for integer-valued test vectors, which the DuckDB oracle
  relies on),
- ``ip``: negated inner product, so smaller is more similar.

Ties are broken by ascending tuple id everywhere, so the Spark engine,
the local reference engine, numpy brute force, and the DuckDB oracle all
return identical top-k sets.
"""
from __future__ import annotations

import numpy as np

METRICS = ("l2", "ip")


def pairwise_scores(q: np.ndarray, x: np.ndarray, metric: str) -> np.ndarray:
    """Score matrix of shape ``(len(q), len(x))``; smaller = more similar."""
    q = np.ascontiguousarray(q, dtype=np.float64)
    x = np.ascontiguousarray(x, dtype=np.float64)
    if metric == "l2":
        # ||q||^2 - 2 q.x + ||x||^2, computed with one matmul.
        return (
            (q**2).sum(axis=1)[:, None]
            - 2.0 * (q @ x.T)
            + (x**2).sum(axis=1)[None, :]
        )
    if metric == "ip":
        return -(q @ x.T)
    raise ValueError(f"metric must be one of {METRICS}, got {metric!r}")


def topk_rows(
    scores: np.ndarray, ids: np.ndarray, k: int
) -> tuple[np.ndarray, np.ndarray]:
    """Per-row top-k of a score matrix with ``(score, id)`` tie-break.

    Returns ``(top_ids, top_scores)`` of shape ``(rows, k')`` with
    ``k' = min(k, scores.shape[1])``, each row sorted ascending by
    ``(score, id)``.
    """
    nq, n = scores.shape
    k = min(k, n)
    if k == 0:
        return np.empty((nq, 0), dtype=ids.dtype), np.empty((nq, 0))
    # Two-key sort: permute columns into ascending-id order once (ids are
    # shared by every row), then a stable per-row sort on score yields
    # (score, id) order. A plain argpartition would split score ties at
    # the k boundary arbitrarily, violating the tie-break contract.
    perm = np.argsort(ids, kind="stable")
    ids_sorted = ids[perm]
    s = np.ascontiguousarray(scores[:, perm])
    order = np.argsort(s, axis=1, kind="stable")[:, :k]
    row = np.arange(nq)[:, None]
    return ids_sorted[order], s[row, order]


def merge_topk(
    ids_a: np.ndarray,
    scores_a: np.ndarray,
    ids_b: np.ndarray,
    scores_b: np.ndarray,
    k: int,
) -> tuple[np.ndarray, np.ndarray]:
    """Merge two per-query top-k lists (same number of rows) into one.

    Used to combine partial results from different posting lists or
    partitions; the per-query bounded-heap of Algorithm 3 line 12 is
    expressed as repeated merges of sorted arrays.
    """
    ids = np.concatenate([ids_a, ids_b], axis=1)
    scores = np.concatenate([scores_a, scores_b], axis=1)
    return _merge(ids, scores, k)


def _merge(ids: np.ndarray, scores: np.ndarray, k: int) -> tuple[np.ndarray, np.ndarray]:
    nq, n = scores.shape
    k = min(k, n)
    row = np.arange(nq)[:, None]
    order = np.argsort(ids, axis=1, kind="stable")
    ids, scores = ids[row, order], scores[row, order]
    order = np.argsort(scores, axis=1, kind="stable")
    ids, scores = ids[row, order], scores[row, order]
    return ids[:, :k], scores[:, :k]
