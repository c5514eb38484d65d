"""Unit tests for layout planning (plan_hqi / plan_range / plan_flat)
and the local materializer."""
import numpy as np
import pytest

from repro.bench.datasets import bigann_lite, bigann_workload
from repro.core.kmeans import assign
from repro.index.layout import (
    CENTROID_COL,
    materialize_local,
    plan_flat,
    plan_hqi,
    plan_range,
)
from repro.kg.entities import kg_entities
from repro.kg.workload import relatedqs_workload


@pytest.fixture(scope="module")
def kg():
    return kg_entities(n=3_000, dim=8, seed=0)


@pytest.fixture(scope="module")
def wl(kg):
    return relatedqs_workload(kg, n_queries_per_split=150, seed=0)[0]


@pytest.fixture(scope="module")
def ms():
    return bigann_lite("msturing", n=2_000, seed=0)


class TestPlanHQI:
    def test_pid_assignment_total(self, kg, wl):
        plan = plan_hqi(kg, wl, min_size=256)
        assert plan.kind == "hqi"
        assert len(plan.pid_of_row) == kg.n
        assert set(np.unique(plan.pid_of_row)) <= set(range(plan.n_parts))

    def test_min_size_bounds_partition_count(self, kg, wl):
        small = plan_hqi(kg, wl, min_size=128)
        large = plan_hqi(kg, wl, min_size=1024)
        assert small.n_parts >= large.n_parts
        # No partition can be smaller than a split of a MIN_SIZE node
        # would allow; the tree never splits nodes at or below MIN_SIZE.
        counts = np.bincount(large.pid_of_row)
        assert counts.max() >= 1024 / 2 or large.n_parts == 1

    def test_m_zero_has_no_routing_centroids(self, kg, wl):
        plan = plan_hqi(kg, wl, m=0)
        assert plan.routing_centroids is None
        assert all(
            getattr(a, "attr", "") != CENTROID_COL for a in plan.tree.atoms
        )

    def test_m_positive_adds_centroid_atoms(self, kg, wl):
        plan = plan_hqi(kg, wl, m=5, n_routing_centroids=16, min_size=256)
        assert plan.routing_centroids.shape == (16, kg.dim)
        centroid_atoms = [
            a for a in plan.tree.atoms if getattr(a, "attr", "") == CENTROID_COL
        ]
        assert len(centroid_atoms) == 16

    def test_partitions_purify_templates(self, kg, wl):
        """Weighted cost (Eq. 1) of the qd-tree layout must beat a random
        layout with the same partition count."""
        plan = plan_hqi(kg, wl, min_size=256)
        counts = {t: c for t, c in wl.template_counts().items()}
        tree = plan.tree
        qd_cost = 0
        for tid, weight in counts.items():
            g = tree.group_for(list(wl.templates[tid]))
            for pid in tree.route_group(g):
                qd_cost += weight * tree.leaves[pid].n_rows
        rand_cost = sum(counts.values()) * kg.n  # every query scans all
        assert qd_cost < 0.7 * rand_cost


class TestPlanRange:
    def test_bucket_assignment_matches_edges(self, ms):
        plan = plan_range(ms, attr="A", n_parts=8)
        vals = ms.pdf["A"].to_numpy()
        for b in range(8):
            rows = vals[plan.pid_of_row == b]
            if b > 0:
                assert rows.min() >= plan.range_edges[b - 1]
            if b < 7:
                assert rows.max() <= plan.range_edges[b]

    def test_n_parts(self, ms):
        plan = plan_range(ms, attr="B", n_parts=5)
        assert plan.n_parts == 5
        assert plan.range_attr == "B"
        assert len(plan.range_edges) == 4


class TestPlanFlat:
    def test_lists_assigned_to_nearest_centroid(self, ms):
        plan = plan_flat(ms, n_buckets=4, seed=0)
        np.testing.assert_array_equal(
            plan.list_of_row, assign(ms.vecs(), plan.global_centroids)
        )

    def test_sqrt_n_lists(self, ms):
        plan = plan_flat(ms, n_buckets=4, seed=0)
        assert len(plan.global_centroids) == int(np.sqrt(ms.n))

    def test_buckets_capped_by_lists(self):
        tiny = bigann_lite("msturing", n=9, seed=0)
        plan = plan_flat(tiny, n_buckets=64, seed=0)
        assert plan.n_buckets <= 3  # sqrt(9) lists


class TestMaterializeLocal:
    def test_partitions_cover_dataset(self, kg, wl):
        plan = plan_hqi(kg, wl, min_size=256)
        parts = materialize_local(kg, plan)
        total = sum(len(p.ids) for p in parts.values())
        assert total == kg.n
        all_ids = np.concatenate([p.ids for p in parts.values()])
        assert sorted(all_ids.tolist()) == sorted(kg.ids().tolist())

    def test_partition_ivf_sqrt_lists(self, kg, wl):
        plan = plan_hqi(kg, wl, min_size=256)
        parts = materialize_local(kg, plan)
        for p in parts.values():
            assert len(p.centroids) == max(1, int(np.sqrt(len(p.ids))))

    def test_flat_partitions_keep_global_list_ids(self, ms):
        plan = plan_flat(ms, n_buckets=4, seed=0)
        parts = materialize_local(ms, plan)
        for pid, p in parts.items():
            assert p.global_list_ids is not None
            assert all(g % 4 == pid for g in p.global_list_ids)

    def test_attrs_aligned_with_ids(self, kg, wl):
        plan = plan_hqi(kg, wl, min_size=256)
        parts = materialize_local(kg, plan)
        pdf = kg.pdf.set_index("id")
        p = parts[0]
        expected = pdf.loc[p.ids, "etype"].to_numpy()
        np.testing.assert_array_equal(p.attrs["etype"].to_numpy(), expected)
