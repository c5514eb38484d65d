"""Shared hybrid-query execution engine (S8/S9 core).

``search_partition`` is the single implementation of per-partition
hybrid search used by *both* engines:

- the local reference engine loops over partitions on the driver
  (used for nprobe tuning and as the parity oracle in tests);
- the Spark engine calls it inside ``cogroup(...).applyInPandas`` tasks,
  one task per index partition.

Both engines therefore produce bit-identical results; tests assert it.

The executor implements the paper's batching (§5, Algorithm 3):
queries are grouped by attribute constraint (template) so each filter is
evaluated once per (template, partition) — this is the
attribute-constraint batching all approaches get by default in §6.1 —
and, when ``batch_vectors`` is on (HQI), additionally grouped by probed
centroid so each (query-group × posting-list) block is one matmul.
With ``batch_vectors`` off, posting lists are scanned per query,
modeling the FAISS-style online traversal of the baselines.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.distance import pairwise_scores
from repro.core.ivf import PAD_ID, IVFIndex, SearchStats
from repro.core.predicates import Conjunction
from repro.core.types import Workload

RESULT_COLUMNS = ["qpos", "tid", "id", "score", "scanned", "dcomp"]


@dataclass
class ExecParams:
    """Query-time parameters shared by both engines."""

    k: int
    metric: str
    templates: dict[int, Conjunction]
    nprobe_by_tid: dict[int, int]
    qvecs: np.ndarray
    batch_vectors: bool = True
    apply_filter: bool = True  # False => PostFilter's unfiltered vector stage


@dataclass
class PartitionData:
    """One physical index partition, reconstructed from a pandas chunk."""

    pid: int
    ids: np.ndarray  # (n,) int64
    vecs: np.ndarray  # (n, d) float64
    labels: np.ndarray  # (n,) local posting-list index per row
    centroids: np.ndarray  # (L, d) — row l is local list l's centroid
    attrs: pd.DataFrame  # attribute columns, aligned with ids/vecs rows
    global_list_ids: np.ndarray | None = None  # local l -> global list id

    @classmethod
    def from_layout_chunk(
        cls,
        pid: int,
        chunk: pd.DataFrame,
        centroids: np.ndarray,
        attr_cols: list[str],
        *,
        lists_are_global: bool = False,
    ) -> "PartitionData":
        """Build from layout rows ``(pid, list_id, id, vec, attrs...)``.

        ``lists_are_global`` covers the bucketed (flat-IVF) layout where
        ``list_id`` indexes the *global* centroid table and the chunk
        holds only the lists assigned to this bucket.
        """
        ids = chunk["id"].to_numpy(dtype=np.int64)
        vecs = np.stack(chunk["vec"].to_numpy()).astype(np.float64)
        raw = chunk["list_id"].to_numpy(dtype=np.int64)
        if lists_are_global:
            present = np.unique(raw)
            local_of_global = {int(g): l for l, g in enumerate(present)}
            labels = np.array([local_of_global[int(g)] for g in raw])
            cents = centroids[present]
            global_ids = present
        else:
            labels = raw
            cents = centroids
            global_ids = None
        return cls(
            pid=pid,
            ids=ids,
            vecs=vecs,
            labels=labels,
            centroids=cents,
            attrs=chunk[attr_cols].reset_index(drop=True),
            global_list_ids=global_ids,
        )

    def index(self) -> IVFIndex:
        idx = IVFIndex.from_assignment(
            self.ids, self.vecs, self.labels, self.centroids, metric="l2"
        )
        return idx


def search_partition(
    data: PartitionData,
    routed: pd.DataFrame,  # columns: qpos, tid, and optionally "lists"
    params: ExecParams,
) -> pd.DataFrame:
    """Run all queries routed to one partition; returns RESULT_COLUMNS rows.

    Result rows have ``id >= 0``; one stats row per template (``id == -1``)
    carries the partition's tuples-scanned / distance-computation counters.
    """
    idx = data.index()
    idx.metric = params.metric
    # Permutation from attrs/chunk row order to index row order, for masks.
    source_rows = np.argsort(data.labels, kind="stable")
    out_frames = []
    has_lists = "lists" in routed.columns and routed["lists"].notna().any()
    for tid, grp in routed.groupby("tid", sort=True):
        tid = int(tid)
        template = params.templates[tid]
        stats = SearchStats()
        mask = None
        if params.apply_filter and len(template):
            mask = template.mask(data.attrs)[source_rows]
        qpos = grp["qpos"].to_numpy(dtype=np.int64)
        qv = params.qvecs[qpos]
        probes = None
        if has_lists:
            assert data.global_list_ids is not None
            # Vectorized global -> local list translation via a lookup
            # table (-1 marks lists not stored in this bucket).
            table = np.full(int(data.global_list_ids.max()) + 1, -1, dtype=np.int64)
            table[data.global_list_ids] = np.arange(len(data.global_list_ids))
            rows_lists = [np.asarray(r, dtype=np.int64) for r in grp["lists"]]
            lens = np.array([len(r) for r in rows_lists])
            flat = (
                np.concatenate(rows_lists) if rows_lists else np.empty(0, np.int64)
            )
            in_range = flat < len(table)
            locs = np.where(in_range, table[np.minimum(flat, len(table) - 1)], -1)
            cuts = np.cumsum(lens)[:-1]
            probes = [p[p >= 0] for p in np.split(locs, cuts)]
        nprobe = params.nprobe_by_tid.get(tid, 1)
        fn = idx.batch_search if params.batch_vectors else idx.search
        res_ids, res_scores = fn(
            qv, params.k, nprobe, mask=mask, stats=stats, probes=probes
        )
        valid = res_ids != PAD_ID
        n_per_q = valid.sum(axis=1)
        rows = pd.DataFrame(
            {
                "qpos": np.repeat(qpos, n_per_q),
                "tid": tid,
                "id": res_ids[valid],
                "score": res_scores[valid],
                "scanned": 0,
                "dcomp": 0,
            }
        )
        stats_row = pd.DataFrame(
            {
                "qpos": [-1],
                "tid": [tid],
                "id": [-1],
                "score": [0.0],
                "scanned": [stats.tuples_scanned],
                "dcomp": [stats.distance_computations],
            }
        )
        out_frames.append(rows)
        out_frames.append(stats_row)
    if not out_frames:
        return pd.DataFrame(
            {
                "qpos": pd.Series(dtype=np.int64),
                "tid": pd.Series(dtype=np.int64),
                "id": pd.Series(dtype=np.int64),
                "score": pd.Series(dtype=np.float64),
                "scanned": pd.Series(dtype=np.int64),
                "dcomp": pd.Series(dtype=np.int64),
            }
        )
    return pd.concat(out_frames, ignore_index=True)


@dataclass
class RunResult:
    """Merged top-k per query plus workload-level work counters."""

    ids_by_qid: dict = field(default_factory=dict)  # qid -> np.ndarray (<=k)
    scores_by_qid: dict = field(default_factory=dict)
    stats_by_tid: dict = field(default_factory=dict)  # tid -> SearchStats
    wall_seconds: float = 0.0

    @property
    def tuples_scanned(self) -> int:
        return sum(s.tuples_scanned for s in self.stats_by_tid.values())

    @property
    def distance_computations(self) -> int:
        return sum(s.distance_computations for s in self.stats_by_tid.values())


def merge_rows_to_result(
    rows: pd.DataFrame, workload: Workload, k: int
) -> RunResult:
    """Global top-k merge of per-partition result rows + stats fold."""
    res = RunResult()
    stats_rows = rows[rows["id"] < 0]
    for tid, grp in stats_rows.groupby("tid"):
        res.stats_by_tid[int(tid)] = SearchStats(
            tuples_scanned=int(grp["scanned"].sum()),
            distance_computations=int(grp["dcomp"].sum()),
        )
    data_rows = rows[rows["id"] >= 0]
    if len(data_rows):
        # Vectorized per-query top-k: lexsort by (qpos, score, id), rank
        # within each qpos run, keep rank < k. A candidate can reach a
        # query from at most one partition (partitions are disjoint), so
        # no dedup is needed.
        qpos = data_rows["qpos"].to_numpy(dtype=np.int64)
        ids = data_rows["id"].to_numpy(dtype=np.int64)
        score = data_rows["score"].to_numpy()
        perm = np.lexsort((ids, score, qpos))
        qpos, ids, score = qpos[perm], ids[perm], score[perm]
        starts = np.concatenate([[0], np.flatnonzero(np.diff(qpos)) + 1])
        sizes = np.diff(np.concatenate([starts, [len(qpos)]]))
        ranks = np.arange(len(qpos)) - np.repeat(starts, sizes)
        keep = ranks < k
        qpos, ids, score = qpos[keep], ids[keep], score[keep]
        cuts = np.flatnonzero(np.diff(qpos)) + 1
        uniq_q = qpos[np.concatenate([[0], cuts])] if len(qpos) else []
        for q, gid, gsc in zip(
            uniq_q, np.split(ids, cuts), np.split(score, cuts)
        ):
            qid = int(workload.qids[int(q)])
            res.ids_by_qid[qid] = gid
            res.scores_by_qid[qid] = gsc
    for qid in workload.qids:
        res.ids_by_qid.setdefault(int(qid), np.empty(0, dtype=np.int64))
        res.scores_by_qid.setdefault(int(qid), np.empty(0))
    return res


def post_filter(
    result: RunResult,
    attrs_by_id: pd.DataFrame,  # indexed by tuple id, attribute columns
    workload: Workload,
    k: int,
) -> RunResult:
    """Strategy D's second phase: drop candidates violating the attribute
    constraint, then truncate to k. Recall is measured on this output."""
    out = RunResult(
        stats_by_tid=result.stats_by_tid, wall_seconds=result.wall_seconds
    )
    for qpos in range(workload.nq):
        qid = int(workload.qids[qpos])
        tid = int(workload.qtemplates[qpos])
        template = workload.templates[tid]
        ids = result.ids_by_qid.get(qid, np.empty(0, dtype=np.int64))
        if len(ids) == 0 or not len(template):
            out.ids_by_qid[qid] = ids[:k]
            out.scores_by_qid[qid] = result.scores_by_qid.get(qid, np.empty(0))[:k]
            continue
        cand_attrs = attrs_by_id.loc[ids]
        keep = template.mask(cand_attrs)
        out.ids_by_qid[qid] = ids[keep][:k]
        out.scores_by_qid[qid] = result.scores_by_qid[qid][keep][:k]
    return out


class Timer:
    """Context-manager wall clock for run/build phases."""

    def __enter__(self):
        self.start = time.perf_counter()
        return self

    def __exit__(self, *exc):
        self.seconds = time.perf_counter() - self.start
        return False
