"""Unit tests for the execution-engine building blocks: PartitionData,
search_partition, result merging, and post-filtering."""
import numpy as np
import pandas as pd
import pytest

from repro.core.ivf import SearchStats
from repro.core.predicates import Cmp, Conjunction, NotNull
from repro.core.types import Workload
from repro.exec.engine import (
    ExecParams,
    PartitionData,
    RunResult,
    merge_rows_to_result,
    post_filter,
    search_partition,
)


def _toy_partition(n=60, d=4, seed=0, n_lists=4):
    g = np.random.default_rng(seed)
    from repro.core.kmeans import kmeans

    vecs = g.standard_normal((n, d))
    centroids, labels = kmeans(vecs, n_lists, seed=1)
    attrs = pd.DataFrame(
        {
            "etype": g.choice(["a", "b"], n),
            "h": np.where(g.random(n) < 0.5, g.random(n), np.nan),
        }
    )
    return PartitionData(
        pid=0,
        ids=np.arange(100, 100 + n, dtype=np.int64),
        vecs=vecs,
        labels=labels,
        centroids=centroids,
        attrs=attrs,
    )


def _toy_workload(data, nq=5, seed=1):
    g = np.random.default_rng(seed)
    templates = {
        1: Conjunction([Cmp("etype", "=", "a")]),
        2: Conjunction([NotNull("h")]),
    }
    return Workload(
        templates=templates,
        qids=np.arange(nq, dtype=np.int64),
        qvecs=g.standard_normal((nq, data.vecs.shape[1])),
        qtemplates=np.array([1, 2, 1, 2, 1][:nq], dtype=np.int64),
    )


def _params(wl, **kw):
    defaults = dict(
        k=3,
        metric="l2",
        templates=wl.templates,
        nprobe_by_tid={1: 10**6, 2: 10**6},
        qvecs=wl.qvecs,
        batch_vectors=True,
        apply_filter=True,
    )
    defaults.update(kw)
    return ExecParams(**defaults)


class TestSearchPartition:
    def test_results_satisfy_filters(self):
        data = _toy_partition()
        wl = _toy_workload(data)
        routed = pd.DataFrame(
            {"qpos": np.arange(wl.nq), "tid": wl.qtemplates}
        )
        rows = search_partition(data, routed, _params(wl))
        res = rows[rows["id"] >= 0]
        id_to_row = {int(i): r for r, i in enumerate(data.ids)}
        for _, r in res.iterrows():
            tid = int(r["tid"])
            row = id_to_row[int(r["id"])]
            mask = wl.templates[tid].mask(data.attrs)
            assert mask[row]

    def test_stats_row_per_template(self):
        data = _toy_partition()
        wl = _toy_workload(data)
        routed = pd.DataFrame({"qpos": np.arange(wl.nq), "tid": wl.qtemplates})
        rows = search_partition(data, routed, _params(wl))
        stats = rows[rows["id"] < 0]
        assert sorted(stats["tid"]) == [1, 2]
        assert (stats["scanned"] > 0).all()

    def test_no_filter_mode_ignores_attrs(self):
        data = _toy_partition()
        wl = _toy_workload(data)
        routed = pd.DataFrame({"qpos": [0], "tid": [1]})
        rows = search_partition(data, routed, _params(wl, apply_filter=False))
        res_ids = rows[rows["id"] >= 0]["id"]
        # Unfiltered: may contain tuples violating template 1.
        mask = wl.templates[1].mask(data.attrs)
        id_to_row = {int(i): r for r, i in enumerate(data.ids)}
        assert len(res_ids) == 3  # full k returned
        assert any(not mask[id_to_row[int(i)]] for i in res_ids) or mask.all()

    def test_empty_routed_returns_empty(self):
        data = _toy_partition()
        wl = _toy_workload(data)
        routed = pd.DataFrame({"qpos": pd.Series(dtype=np.int64),
                               "tid": pd.Series(dtype=np.int64)})
        rows = search_partition(data, routed, _params(wl))
        assert rows.empty

    def test_batch_and_per_query_modes_agree(self):
        data = _toy_partition(n=120, n_lists=6)
        wl = _toy_workload(data)
        routed = pd.DataFrame({"qpos": np.arange(wl.nq), "tid": wl.qtemplates})
        p = _params(wl, nprobe_by_tid={1: 3, 2: 3})
        a = search_partition(data, routed, p)
        p2 = _params(wl, nprobe_by_tid={1: 3, 2: 3}, batch_vectors=False)
        b = search_partition(data, routed, p2)
        ka = a[a["id"] >= 0].sort_values(["qpos", "score", "id"]).reset_index(drop=True)
        kb = b[b["id"] >= 0].sort_values(["qpos", "score", "id"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(ka[["qpos", "id"]], kb[["qpos", "id"]])


class TestPartitionDataFromChunk:
    def test_local_list_ids(self):
        data = _toy_partition()
        chunk = pd.DataFrame(
            {
                "pid": 0,
                "list_id": data.labels,
                "id": data.ids,
                "vec": list(data.vecs),
                "etype": data.attrs["etype"],
                "h": data.attrs["h"],
            }
        )
        rebuilt = PartitionData.from_layout_chunk(
            0, chunk, data.centroids, ["etype", "h"]
        )
        np.testing.assert_array_equal(rebuilt.ids, data.ids)
        np.testing.assert_array_equal(rebuilt.labels, data.labels)
        assert rebuilt.global_list_ids is None

    def test_global_list_ids_compacted(self):
        data = _toy_partition()
        global_lists = data.labels * 3 + 1  # sparse global numbering
        all_centroids = np.zeros((3 * data.centroids.shape[0] + 1,
                                  data.centroids.shape[1]))
        all_centroids[np.unique(global_lists)] = data.centroids[
            np.unique(data.labels)
        ]
        chunk = pd.DataFrame(
            {
                "pid": 2,
                "list_id": global_lists,
                "id": data.ids,
                "vec": list(data.vecs),
                "etype": data.attrs["etype"],
                "h": data.attrs["h"],
            }
        )
        rebuilt = PartitionData.from_layout_chunk(
            2, chunk, all_centroids, ["etype", "h"], lists_are_global=True
        )
        assert rebuilt.global_list_ids is not None
        # Local labels must be a compaction of the global numbering.
        np.testing.assert_array_equal(
            rebuilt.global_list_ids[rebuilt.labels], global_lists
        )


class TestMergeRows:
    def _wl(self, nq=3):
        return Workload(
            templates={1: Conjunction()},
            qids=np.array([10, 20, 30][:nq], dtype=np.int64),
            qvecs=np.zeros((nq, 2)),
            qtemplates=np.ones(nq, dtype=np.int64),
        )

    def test_merges_across_partitions(self):
        wl = self._wl()
        rows = pd.DataFrame(
            {
                "qpos": [0, 0, 0, 1],
                "tid": [1, 1, 1, 1],
                "id": [5, 7, 6, 9],
                "score": [0.3, 0.1, 0.2, 0.5],
                "scanned": [0, 0, 0, 0],
                "dcomp": [0, 0, 0, 0],
            }
        )
        res = merge_rows_to_result(rows, wl, k=2)
        assert res.ids_by_qid[10].tolist() == [7, 6]
        assert res.ids_by_qid[20].tolist() == [9]
        assert res.ids_by_qid[30].tolist() == []

    def test_stats_folded_by_template(self):
        wl = self._wl(1)
        rows = pd.DataFrame(
            {
                "qpos": [-1, -1],
                "tid": [1, 1],
                "id": [-1, -1],
                "score": [0.0, 0.0],
                "scanned": [100, 50],
                "dcomp": [10, 5],
            }
        )
        res = merge_rows_to_result(rows, wl, k=2)
        assert res.stats_by_tid[1].tuples_scanned == 150
        assert res.stats_by_tid[1].distance_computations == 15
        assert res.tuples_scanned == 150

    def test_tie_break_on_merge(self):
        wl = self._wl(1)
        rows = pd.DataFrame(
            {
                "qpos": [0, 0],
                "tid": [1, 1],
                "id": [9, 4],
                "score": [1.0, 1.0],
                "scanned": [0, 0],
                "dcomp": [0, 0],
            }
        )
        res = merge_rows_to_result(rows, wl, k=1)
        assert res.ids_by_qid[10].tolist() == [4]


class TestPostFilter:
    def test_filters_and_truncates(self):
        wl = Workload(
            templates={1: Conjunction([Cmp("etype", "=", "a")])},
            qids=np.array([0], dtype=np.int64),
            qvecs=np.zeros((1, 2)),
            qtemplates=np.array([1], dtype=np.int64),
        )
        attrs = pd.DataFrame(
            {"etype": ["a", "b", "a", "a"]}, index=[100, 101, 102, 103]
        )
        res = RunResult(
            ids_by_qid={0: np.array([101, 100, 102, 103])},
            scores_by_qid={0: np.array([0.1, 0.2, 0.3, 0.4])},
        )
        out = post_filter(res, attrs, wl, k=2)
        assert out.ids_by_qid[0].tolist() == [100, 102]
        np.testing.assert_allclose(out.scores_by_qid[0], [0.2, 0.3])

    def test_empty_template_passthrough(self):
        wl = Workload(
            templates={1: Conjunction()},
            qids=np.array([0], dtype=np.int64),
            qvecs=np.zeros((1, 2)),
            qtemplates=np.array([1], dtype=np.int64),
        )
        attrs = pd.DataFrame({"x": [1.0]}, index=[5])
        res = RunResult(
            ids_by_qid={0: np.array([5])}, scores_by_qid={0: np.array([0.5])}
        )
        out = post_filter(res, attrs, wl, k=1)
        assert out.ids_by_qid[0].tolist() == [5]

    def test_stats_preserved(self):
        wl = Workload(
            templates={1: Conjunction()},
            qids=np.array([0], dtype=np.int64),
            qvecs=np.zeros((1, 2)),
            qtemplates=np.array([1], dtype=np.int64),
        )
        attrs = pd.DataFrame({"x": [1.0]}, index=[5])
        res = RunResult(
            ids_by_qid={0: np.array([5])},
            scores_by_qid={0: np.array([0.5])},
            stats_by_tid={1: SearchStats(7, 3)},
        )
        out = post_filter(res, attrs, wl, k=1)
        assert out.stats_by_tid[1].tuples_scanned == 7
