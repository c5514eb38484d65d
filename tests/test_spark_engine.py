"""Distributed engine tests: Spark layout/build parity with the local
reference, Spark execution parity, Strategy A on Spark vs the DuckDB
oracle, and NULL-semantics agreement between Spark SQL and the engines."""
import numpy as np
import pandas as pd
import pytest

from repro.bench.datasets import bigann_lite, bigann_workload
from repro.core.predicates import Cmp, Conjunction, In, NotNull
from repro.exec.recall import exhaustive_local, exhaustive_spark, recall_at_k
from repro.exec.strategies import build_index, run_queries
from repro.index.layout import materialize_local, materialize_spark, plan_flat, plan_hqi
from repro.kg.entities import kg_entities
from repro.kg.workload import relatedqs_workload
from repro.oracle import assert_equivalent

K = 10
FULL = 10**6


@pytest.fixture(scope="module")
def kg():
    return kg_entities(n=2_500, dim=8, seed=0)


@pytest.fixture(scope="module")
def kg_load(kg):
    return relatedqs_workload(kg, n_queries_per_split=120, seed=0)[0]


@pytest.fixture(scope="module")
def ms():
    return bigann_lite("msturing", n=2_000, seed=0)


@pytest.fixture(scope="module")
def ms_load(ms):
    return bigann_workload(ms, nq=6, seed=1)


def _nprobe_all(workload, value):
    return {int(t): value for t in np.unique(workload.qtemplates)}


def _assert_results_equal(a, b, workload):
    for qid in workload.qids:
        qid = int(qid)
        np.testing.assert_array_equal(
            a.ids_by_qid[qid], b.ids_by_qid[qid], err_msg=f"qid={qid}"
        )
        np.testing.assert_allclose(
            a.scores_by_qid[qid], b.scores_by_qid[qid], atol=1e-9
        )


class TestToSpark:
    def test_roundtrip_schema_and_nulls(self, spark, kg):
        df = kg.to_spark(spark)
        assert df.count() == kg.n
        # NaN attrs must be true SQL NULLs.
        n_null = df.filter("height IS NULL").count()
        assert n_null == int(kg.pdf["height"].isna().sum())

    def test_spark_sql_filter_matches_pandas_mask(self, spark, kg):
        df = kg.to_spark(spark)
        for pred in [
            Conjunction([Cmp("etype", "=", "person"), NotNull("height")]),
            Conjunction([In("etype", ["song", "company"])]),
            Conjunction([NotNull("popularity")]),
        ]:
            got = {r["id"] for r in df.filter(pred.to_sql()).select("id").collect()}
            expected = set(kg.pdf["id"][pred.mask(kg.pdf)].tolist())
            assert got == expected


class TestLayoutParity:
    @pytest.mark.parametrize("kind", ["hqi", "flat"])
    def test_spark_layout_matches_local(self, spark, kg, kg_load, kind):
        """Same plan + pid-keyed seeds => the distributed build must put
        every tuple in the same partition and posting list as the local
        build, with identical centroids."""
        if kind == "hqi":
            plan = plan_hqi(kg, kg_load, min_size=256)
        else:
            plan = plan_flat(kg, n_buckets=4)
        local = materialize_local(kg, plan)
        layout = materialize_spark(spark, kg, plan)
        rows = layout.df.select("pid", "list_id", "id").toPandas()
        by_pid = {int(p): g for p, g in rows.groupby("pid")}
        assert set(by_pid) == set(local)
        for pid, part in local.items():
            got = by_pid[pid].sort_values("id")
            want = pd.DataFrame(
                {"id": part.ids, "list": part.labels}
            ).sort_values("id")
            np.testing.assert_array_equal(
                got["id"].to_numpy(), want["id"].to_numpy()
            )
            if kind == "flat":
                want_global = part.global_list_ids[want["list"].to_numpy()]
                np.testing.assert_array_equal(
                    got["list_id"].to_numpy(), want_global
                )
            else:
                np.testing.assert_array_equal(
                    got["list_id"].to_numpy(), want["list"].to_numpy()
                )
                np.testing.assert_allclose(
                    layout.centroids_by_pid[pid], part.centroids, atol=1e-12
                )
        layout.unpersist()


class TestExecutionParity:
    """run_spark and run_local share search_partition; the full pipelines
    must produce identical top-k and identical work counters."""

    @pytest.mark.parametrize("approach", ["hqi", "prefilter", "postfilter"])
    def test_kg_parity(self, spark, kg, kg_load, approach):
        wl = kg_load if approach == "hqi" else None
        local = build_index(approach, kg, wl, engine="local", min_size=256)
        dist = build_index(approach, kg, wl, engine="spark", spark=spark, min_size=256)
        cfg = _nprobe_all(kg_load, 4)
        a = run_queries(local, kg_load, k=K, nprobe_by_tid=cfg, engine="local")
        b = run_queries(
            dist, kg_load, k=K, nprobe_by_tid=cfg, engine="spark", spark=spark
        )
        _assert_results_equal(a, b, kg_load)
        assert a.tuples_scanned == b.tuples_scanned
        assert a.distance_computations == b.distance_computations

    def test_hqi_m10_parity(self, spark, kg, kg_load):
        local = build_index("hqi", kg, kg_load, engine="local", m=10, min_size=256)
        dist = build_index(
            "hqi", kg, kg_load, engine="spark", spark=spark, m=10, min_size=256
        )
        cfg = _nprobe_all(kg_load, FULL)
        a = run_queries(local, kg_load, k=K, nprobe_by_tid=cfg, engine="local")
        b = run_queries(
            dist, kg_load, k=K, nprobe_by_tid=cfg, engine="spark", spark=spark
        )
        _assert_results_equal(a, b, kg_load)

    def test_range_parity_on_bigann(self, spark, ms, ms_load):
        local = build_index("range", ms, ms_load, engine="local", range_parts=4)
        dist = build_index(
            "range", ms, ms_load, engine="spark", spark=spark, range_parts=4
        )
        cfg = _nprobe_all(ms_load, 4)
        a = run_queries(local, ms_load, k=K, nprobe_by_tid=cfg, engine="local")
        b = run_queries(
            dist, ms_load, k=K, nprobe_by_tid=cfg, engine="spark", spark=spark
        )
        _assert_results_equal(a, b, ms_load)

    def test_spark_hqi_full_probe_equals_exhaustive(self, spark, kg, kg_load):
        dist = build_index("hqi", kg, kg_load, engine="spark", spark=spark, min_size=256)
        res = run_queries(
            dist, kg_load, k=K, nprobe_by_tid=_nprobe_all(kg_load, FULL),
            engine="spark", spark=spark,
        )
        gt = exhaustive_local(kg, kg_load, K)
        _assert_results_equal(res, gt, kg_load)


class TestExhaustiveSpark:
    def test_matches_local(self, spark, kg, kg_load):
        a = exhaustive_local(kg, kg_load, K)
        b = exhaustive_spark(spark, kg, kg_load, K)
        _assert_results_equal(a, b, kg_load)
        assert recall_at_k(b, a) == 1.0


def _int_vec_dataset(n=300, dim=6, seed=0):
    """Integer-valued vectors => exactly representable squared-L2 scores,
    so Spark and DuckDB agree bit-for-bit (modulo 1e-6 rounding)."""
    from repro.core.types import Dataset

    g = np.random.default_rng(seed)
    vecs = g.integers(0, 40, (n, dim)).astype(np.float64)
    pdf = pd.DataFrame(
        {
            "id": np.arange(n, dtype=np.int64),
            "etype": g.choice(["song", "artist", "person"], n),
        }
    )
    pdf["vec"] = list(vecs)
    pdf = pdf[["id", "vec", "etype"]]
    return Dataset(name="intvec", metric="l2", pdf=pdf, attr_cols=["etype"])


class TestDefinition3Oracle:
    """Definition 3 (batch HVQ processing) checked against DuckDB: the
    same SELECT ... WHERE IsFilterValid ORDER BY Related LIMIT K, with
    squared L2 expressed via list_inner_product."""

    def test_exhaustive_spark_matches_duckdb(self, spark):
        ds = _int_vec_dataset()
        g = np.random.default_rng(1)
        from repro.core.types import Workload

        templates = {
            1: Conjunction([Cmp("etype", "=", "song")]),
            2: Conjunction([In("etype", ["artist", "person"])]),
        }
        nq = 12
        qvecs = g.integers(0, 40, (nq, ds.dim)).astype(np.float64)
        wl = Workload(
            templates=templates,
            qids=np.arange(nq, dtype=np.int64),
            qvecs=qvecs,
            qtemplates=np.array([1, 2] * (nq // 2), dtype=np.int64),
        )
        res = exhaustive_spark(spark, ds, wl, k=5)
        rows = [
            (int(qid), int(i), float(s))
            for qid in wl.qids
            for i, s in zip(res.ids_by_qid[int(qid)], res.scores_by_qid[int(qid)])
        ]
        got_df = spark.createDataFrame(
            pd.DataFrame(rows, columns=["qid", "candidate", "score"])
        )
        q_pdf = pd.DataFrame(
            {
                "qid": wl.qids,
                "qvec": list(qvecs),
                "tid": wl.qtemplates,
            }
        )
        v_pdf = ds.pdf.rename(columns={"vec": "vvec"})
        sql = """
            SELECT q.qid AS qid, v.id AS candidate,
                   list_inner_product(v.vvec, v.vvec)
                 - 2 * list_inner_product(q.qvec, v.vvec)
                 + list_inner_product(q.qvec, q.qvec) AS score
            FROM q, v
            WHERE (q.tid = 1 AND v.etype = 'song')
               OR (q.tid = 2 AND v.etype IN ('artist', 'person'))
            QUALIFY row_number() OVER (
                PARTITION BY q.qid ORDER BY score, v.id
            ) <= 5
        """
        assert_equivalent(got_df, sql, q=q_pdf, v=v_pdf)


class TestSynthDataWrappers:
    def test_kg_vectors(self, spark):
        from repro.synth_data import kg_vectors

        df = kg_vectors(spark, n=200, dim=4, seed=0)
        assert df.count() == 200
        assert "etype" in df.columns and "vec" in df.columns

    def test_bigann_vectors(self, spark):
        from repro.synth_data import bigann_vectors

        df = bigann_vectors(spark, name="sift", n=150, seed=0)
        assert df.count() == 150
        assert {"A", "B"}.issubset(set(df.columns))
