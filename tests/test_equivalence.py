"""The paper's central correctness claim: "In all FD experiments, Daisy
outputs the same results with the offline approach."

A Daisy session whose workload covers the whole dataset must converge to a
probabilistic table identical (candidate sets, probabilities and worlds) to
the offline cleaner's output — on SSB, hospital-like data and multi-rule
configurations, with and without the cost-model switch.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import prob
from repro.core.constraints import FD
from repro.core.daisy import DaisySession
from repro.core.offline import offline_clean
from repro.core.planner import Filter, Query
from repro.datagen.hospital import hospital_pdf

PHI = FD(("orderkey",), "suppkey", name="phi")


def _same(a, b, attrs):
    for attr in attrs:
        pd.testing.assert_frame_equal(
            prob.cands_canonical(a, attr), prob.cands_canonical(b, attr)
        )


class TestSSBEquivalence:
    @pytest.fixture(scope="class")
    def pair(self, spark, ssb_small):
        _, dirty, _ = ssb_small
        d = prob.spark_with_tid(spark, dirty)
        sess = DaisySession(spark, {"lineorder": d}, {"lineorder": [PHI]}, use_cost_model=False)
        for lo, hi in [(1, 5), (6, 10), (11, 15), (16, 20)]:
            sess.execute(Query("lineorder", [Filter("suppkey", "between", lo, hi)])).count()
        off = offline_clean(prob.spark_with_tid(spark, dirty), [PHI], mode="vectorized")
        return sess.table("lineorder"), off.table

    def test_rhs_candidates_identical(self, pair):
        _same(*pair, ["suppkey"])

    def test_lhs_candidates_identical(self, pair):
        _same(*pair, ["orderkey"])

    def test_same_repaired_tuple_set(self, pair):
        a, b = pair
        ca = prob.cands_canonical(a, "suppkey")
        cb = prob.cands_canonical(b, "suppkey")
        assert set(ca["tid"]) == set(cb["tid"])


class TestLhsFilterWorkload:
    def test_orderkey_filtered_workload_converges(self, spark, ssb_small):
        # lhs-side filters take the 2-iteration Lemma 2 path
        _, dirty, _ = ssb_small
        d = prob.spark_with_tid(spark, dirty)
        sess = DaisySession(spark, {"lineorder": d}, {"lineorder": [PHI]}, use_cost_model=False)
        for lo, hi in [(1, 50), (51, 100), (101, 150), (151, 200)]:
            sess.execute(Query("lineorder", [Filter("orderkey", "between", lo, hi)])).count()
        off = offline_clean(prob.spark_with_tid(spark, dirty), [PHI], mode="vectorized")
        _same(sess.table("lineorder"), off.table, ["suppkey", "orderkey"])


class TestHospitalMultiRule:
    @pytest.fixture(scope="class")
    def hospital_pair(self, spark):
        dirty, _, _ = hospital_pdf(n_hospitals=48, seed=11)
        rules = [
            FD(("zip",), "city", name="phi1"),
            FD(("name",), "zip", name="phi2"),
            FD(("phone",), "zip", name="phi3"),
        ]
        d = prob.spark_with_tid(spark, dirty)
        sess = DaisySession(spark, {"h": d}, {"h": rules}, use_cost_model=False)
        cities = sorted(dirty["city"].unique())
        half = cities[: len(cities) // 2]
        sess.execute(Query("h", [Filter("city", "in", half)])).count()
        sess.execute(Query("h", [])).count()  # rest of the dataset
        off = offline_clean(prob.spark_with_tid(spark, dirty), rules, mode="vectorized")
        return sess.table("h"), off.table

    @pytest.mark.parametrize("attr", ["zip", "city", "name", "phone"])
    def test_attr_candidates_identical(self, hospital_pair, attr):
        _same(*hospital_pair, [attr])


class TestSwitchEquivalence:
    def test_cost_switch_midway_converges(self, spark, ssb_small):
        _, dirty, _ = ssb_small
        d = prob.spark_with_tid(spark, dirty)
        sess = DaisySession(
            spark, {"lineorder": d}, {"lineorder": [PHI]}, use_cost_model=True, cost_safety=0.05
        )
        for lo, hi in [(1, 5), (6, 10), (11, 15), (16, 20)]:
            sess.execute(Query("lineorder", [Filter("suppkey", "between", lo, hi)])).count()
        off = offline_clean(prob.spark_with_tid(spark, dirty), [PHI], mode="vectorized")
        _same(sess.table("lineorder"), off.table, ["suppkey", "orderkey"])
