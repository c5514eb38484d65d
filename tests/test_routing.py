"""Unit tests for query -> partition routing over each layout kind."""
import numpy as np
import pandas as pd
import pytest

from repro.bench.datasets import bigann_lite, bigann_workload
from repro.core.predicates import Cmp, Conjunction, NotNull
from repro.core.types import Workload
from repro.exec.engine import ExecParams
from repro.exec.routing import _range_pids, route_queries
from repro.index.layout import plan_flat, plan_hqi, plan_range
from repro.kg.entities import kg_entities
from repro.kg.workload import relatedqs_workload


@pytest.fixture(scope="module")
def ms():
    return bigann_lite("msturing", n=3_000, seed=0)


@pytest.fixture(scope="module")
def ms_load(ms):
    return bigann_workload(ms, nq=10, seed=1)


def _params(workload, metric, nprobe=4, **kw):
    return ExecParams(
        k=10,
        metric=metric,
        templates=workload.templates,
        nprobe_by_tid={int(t): nprobe for t in np.unique(workload.qtemplates)},
        qvecs=workload.qvecs,
        **kw,
    )


class TestRangeRouting:
    @pytest.fixture(scope="class")
    def plan(self, ms):
        return plan_range(ms, attr="A", n_parts=8)

    def test_quantile_edges_balanced(self, plan, ms):
        counts = np.bincount(plan.pid_of_row, minlength=8)
        assert counts.min() > 0.8 * ms.n / 8
        assert counts.max() < 1.2 * ms.n / 8

    def test_selective_a_filter_routes_to_one_bucket(self, plan):
        # A < 2^-9 covers only the lowest quantile bucket.
        t = Conjunction([Cmp("A", "<", 2.0**-9)])
        assert _range_pids(t, plan) == [0]

    def test_unselective_a_filter_routes_everywhere(self, plan):
        t = Conjunction([Cmp("A", "<", 1.0)])
        assert _range_pids(t, plan) == list(range(8))

    def test_b_filter_routes_everywhere(self, plan):
        t = Conjunction([Cmp("B", "<", 0.001)])
        assert _range_pids(t, plan) == list(range(8))

    def test_non_range_predicate_routes_everywhere(self, plan):
        t = Conjunction([NotNull("A")])
        assert _range_pids(t, plan) == list(range(8))

    def test_routing_complete_for_matching_rows(self, plan, ms, ms_load):
        """Every row matching a template must live in a routed bucket."""
        params = _params(ms_load, ms.metric)
        routed = route_queries(plan, ms_load, params)
        for tid in (5, 10, 15, 20):
            pids = set(routed[routed["tid"] == tid]["pid"])
            rows = ms_load.templates[tid].mask(ms.pdf)
            assert set(plan.pid_of_row[rows]) <= pids


class TestFlatRouting:
    @pytest.fixture(scope="class")
    def plan(self, ms):
        return plan_flat(ms, n_buckets=4, seed=0)

    def test_lists_spread_round_robin(self, plan):
        assert set(plan.pid_of_row) == set(range(4))
        np.testing.assert_array_equal(
            plan.pid_of_row, plan.list_of_row % 4
        )

    def test_each_query_routed_to_nprobe_lists(self, plan, ms, ms_load):
        params = _params(ms_load, ms.metric, nprobe=6)
        routed = route_queries(plan, ms_load, params)
        per_q = routed.groupby("qpos")["lists"].apply(
            lambda s: sum(len(x) for x in s)
        )
        assert (per_q == 6).all()

    def test_lists_live_in_their_bucket(self, plan, ms, ms_load):
        params = _params(ms_load, ms.metric, nprobe=6)
        routed = route_queries(plan, ms_load, params)
        for _, r in routed.head(50).iterrows():
            assert all(l % 4 == r["pid"] for l in r["lists"])

    def test_nprobe_capped_at_list_count(self, plan, ms, ms_load):
        params = _params(ms_load, ms.metric, nprobe=10**6)
        routed = route_queries(plan, ms_load, params)
        per_q = routed.groupby("qpos")["lists"].apply(
            lambda s: sum(len(x) for x in s)
        )
        assert (per_q == len(plan.global_centroids)).all()


class TestHQIRouting:
    @pytest.fixture(scope="class")
    def kg(self):
        return kg_entities(n=4_000, dim=8, seed=0)

    @pytest.fixture(scope="class")
    def wl(self, kg):
        return relatedqs_workload(kg, n_queries_per_split=150, seed=0)[0]

    def test_m0_routing_is_per_template(self, kg, wl):
        plan = plan_hqi(kg, wl, m=0, min_size=256)
        params = _params(wl, kg.metric)
        routed = route_queries(plan, wl, params)
        # All queries of one template route to the same pid set.
        for tid, grp in routed.groupby("tid"):
            per_q = grp.groupby("qpos")["pid"].apply(frozenset)
            assert per_q.nunique() == 1

    def test_m0_routing_complete(self, kg, wl):
        plan = plan_hqi(kg, wl, m=0, min_size=256)
        params = _params(wl, kg.metric)
        routed = route_queries(plan, wl, params)
        for tid in np.unique(wl.qtemplates):
            pids = set(routed[routed["tid"] == tid]["pid"])
            rows = wl.templates[int(tid)].mask(kg.pdf)
            assert set(plan.pid_of_row[rows]) <= pids

    def test_m_routing_is_subset_of_attribute_routing(self, kg, wl):
        """On the same tree, adding the centroid disjunction (m > 0) can
        only shrink a query's routed partition set — never widen it."""
        plan = plan_hqi(kg, wl, m=10, min_size=256, seed=0)
        tree = plan.tree
        from repro.core.predicates import In
        from repro.index.layout import CENTROID_COL
        from repro.core.distance import pairwise_scores

        d = pairwise_scores(wl.qvecs, plan.routing_centroids, "l2")
        qc = np.argsort(d, axis=1, kind="stable")[:, :10]
        for qpos in range(0, wl.nq, 13):
            tid = int(wl.qtemplates[qpos])
            atoms = list(wl.templates[tid])
            with_c = tree.route_group(
                tree.group_for(
                    atoms, [In(CENTROID_COL, [int(c)]) for c in qc[qpos]]
                )
            )
            without_c = tree.route_group(tree.group_for(atoms))
            assert set(with_c) <= set(without_c)

    def test_selective_template_routes_to_few_partitions(self, kg, wl):
        plan = plan_hqi(kg, wl, m=0, min_size=256)
        params = _params(wl, kg.metric)
        routed = route_queries(plan, wl, params)
        t1 = routed[routed["tid"] == 1].groupby("qpos")["pid"].nunique()
        if len(t1):
            assert t1.iloc[0] <= max(1, plan.n_parts // 2)


class TestEmptyWorkloadRouting:
    def test_empty_routing_frame(self, ms):
        plan = plan_flat(ms, n_buckets=4)
        wl = Workload(
            templates={1: Conjunction()},
            qids=np.empty(0, np.int64),
            qvecs=np.empty((0, ms.dim)),
            qtemplates=np.empty(0, np.int64),
        )
        params = ExecParams(
            k=10, metric=ms.metric, templates=wl.templates,
            nprobe_by_tid={}, qvecs=wl.qvecs,
        )
        routed = route_queries(plan, wl, params)
        assert routed.empty
