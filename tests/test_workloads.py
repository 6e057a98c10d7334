"""Workload-generator tests (§7 experiment drivers)."""
import pytest

from repro import workloads
from repro.core.planner import Filter, Query


class TestRangePartition:
    def test_covers_domain(self):
        parts = workloads.range_partition(1, 100, 10)
        assert parts[0][0] == 1 and parts[-1][1] == 100
        covered = set()
        for a, b in parts:
            covered |= set(range(a, b + 1))
        assert covered == set(range(1, 101))

    def test_non_overlapping(self):
        parts = workloads.range_partition(1, 97, 7)
        for (a1, b1), (a2, b2) in zip(parts, parts[1:]):
            assert b1 < a2

    def test_small_domain(self):
        parts = workloads.range_partition(1, 3, 5)
        assert len(parts) <= 5 and parts[0][0] == 1


class TestSPQueries:
    def test_count_and_attr(self):
        qs = workloads.sp_range_queries("suppkey", 1, 100, 50)
        assert len(qs) == 50
        assert all(q.filters[0].attr == "suppkey" for q in qs)

    def test_selectivity_uniform(self):
        qs = workloads.sp_range_queries("k", 1, 1000, 50)
        widths = [q.filters[0].value2 - q.filters[0].value + 1 for q in qs]
        assert max(widths) - min(widths) <= 1  # 2% each


class TestMixedQueries:
    def test_non_overlapping_and_mixed_ops(self):
        qs = workloads.mixed_random_queries("k", 1, 500, 30, seed=1)
        ops = {q.filters[0].op for q in qs}
        assert ops <= {"=", "between"} and len(ops) == 2
        # ranges don't overlap: sort by start
        spans = []
        for q in qs:
            f = q.filters[0]
            spans.append((f.value, f.value if f.op == "=" else f.value2))
        spans.sort()
        for (a1, b1), (a2, b2) in zip(spans, spans[1:]):
            assert b1 < a2 or a2 > a1

    def test_deterministic(self):
        a = workloads.mixed_random_queries("k", 1, 100, 10, seed=5)
        b = workloads.mixed_random_queries("k", 1, 100, 10, seed=5)
        assert [q.filters[0] for q in a] == [q.filters[0] for q in b]


class TestJoinAndScenarioQueries:
    def test_join_queries(self):
        qs = workloads.join_queries("suppkey", 1, 100, 10)
        assert all(q.join is not None and q.join.right_table == "supplier" for q in qs)

    def test_nestle_queries(self):
        qs = workloads.nestle_queries(["cat_1", "cat_2"])
        assert len(qs) == 2 and qs[0].filters[0].op == "="

    def test_airquality_queries_group_by_year(self):
        qs = workloads.airquality_queries(["county_1"])
        q = qs[0]
        assert q.group_by == ["year"] and q.aggs[0].func == "avg"
