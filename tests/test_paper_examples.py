"""The paper's worked examples (Tables 1-4, Examples 1-6) as executable tests.

These are end-to-end checks that the reproduction derives the *published*
candidate sets, probabilities and query answers, not just self-consistent
ones.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import detect, operators, prob
from repro.core.constraints import FD
from repro.core.daisy import DaisySession
from repro.core.planner import Filter, JoinSpec, Query
from repro.core.prob import TID


@pytest.fixture(scope="module")
def cleaned_cities_session(spark, cities_pdf):
    """clean_σ over Table 2a for the query City = 'Los Angeles' (Example 2),
    run to closure so the full correlated cluster is repaired (Table 2b)."""
    phi1 = FD(("zip",), "city", name="phi1")
    d = prob.spark_with_tid(spark, cities_pdf)
    sess = DaisySession(
        spark, {"cities": d}, {"cities": [phi1]}, use_cost_model=False, relax_mode="closure"
    )
    result = sess.execute(Query("cities", [Filter("city", "=", "Los Angeles")]))
    return sess, result


class TestExample1Table1:
    def test_fd_violation_in_employees(self, spark):
        # Table 1: Jon and Jim share zip 9001 with different cities
        emp = pd.DataFrame(
            {
                "name": ["Jon", "Jim", "Mary", "Jane"],
                "zip": ["9001", "9001", "10001", "10002"],
                "city": ["Los Angeles", "San Francisco", "New York", "New York"],
            }
        )
        d = prob.spark_with_tid(spark, emp)
        fd = FD(("zip",), "city")
        st = detect.group_stats(d, fd)
        vg = detect.violating_complete_groups(d, fd, st)
        assert [r["zip"] for r in vg.collect()] == ["9001"]


class TestExample2Table2b:
    """Query City = 'Los Angeles' over Table 2a; expected output Table 2b."""

    def test_second_tuple_city_candidates(self, cleaned_cities_session):
        sess, _ = cleaned_cities_session
        c = prob.cands_canonical(sess.table("cities"), "city")
        w1 = c[(c.tid == 1) & (c.w == 1)].set_index("v")["p"]
        assert w1["Los Angeles"] == pytest.approx(2 / 3, abs=1e-6)
        assert w1["San Francisco"] == pytest.approx(1 / 3, abs=1e-6)

    def test_second_tuple_zip_candidates(self, cleaned_cities_session):
        sess, _ = cleaned_cities_session
        z = prob.cands_canonical(sess.table("cities"), "zip")
        w2 = z[(z.tid == 1) & (z.w == 2)].set_index("v")["p"]
        assert w2["9001"] == pytest.approx(0.5) and w2["10001"] == pytest.approx(0.5)

    def test_whole_dataset_updated(self, cleaned_cities_session):
        # Table 2b shows all five tuples carrying candidate values
        sess, _ = cleaned_cities_session
        c = prob.cands_canonical(sess.table("cities"), "city")
        assert set(c["tid"]) == {0, 1, 2, 3, 4}


class TestExample3Table3:
    """Query Zip = '9001' returns four tuples over the cleaned data."""

    def test_four_qualifying_tuples(self, cleaned_cities_session):
        sess, _ = cleaned_cities_session
        out = sess.execute(Query("cities", [Filter("zip", "=", "9001")]))
        assert sorted(r[TID] for r in out.select(TID).collect()) == [0, 1, 2, 3]

    def test_fourth_tuple_has_two_worlds(self, cleaned_cities_session):
        sess, _ = cleaned_cities_session
        z = prob.cands_canonical(sess.table("cities"), "zip")
        t3 = z[z.tid == 3]
        assert set(t3["w"]) == {1, 2}
        w2 = t3[t3.w == 2].set_index("v")["p"]
        assert w2["9001"] == pytest.approx(0.5) and w2["10001"] == pytest.approx(0.5)


class TestExample6Table4:
    """Join over Cities and Employee with violations on the join key."""

    @pytest.fixture(scope="class")
    def join_session(self, spark):
        cities = pd.DataFrame(
            {"zip": ["9001", "9001", "10001"],
             "city": ["Los Angeles", "San Francisco", "San Francisco"]}
        )
        emp = pd.DataFrame(
            {"name": ["Peter", "Mary", "Jon"],
             "zip": ["9001", "10001", "10002"],
             "phone": ["23456", "12345", "12345"]}
        )
        phi1 = FD(("zip",), "city", name="phi1")
        phi2 = FD(("phone",), "zip", name="phi2")
        sess = DaisySession(
            spark,
            {"cities": prob.spark_with_tid(spark, cities),
             "emp": prob.spark_with_tid(spark, emp)},
            {"cities": [phi1], "emp": [phi2]},
            use_cost_model=False,
            relax_mode="closure",
        )
        q = Query(
            "cities", [Filter("city", "=", "Los Angeles")],
            join=JoinSpec("emp", "zip", "zip"),
        )
        return sess, sess.execute(q).localCheckpoint(eager=True)

    def test_table4d_relaxed_cities(self, join_session):
        sess, _ = join_session
        z = prob.cands_canonical(sess.table("cities"), "zip")
        t1w2 = z[(z.tid == 1) & (z.w == 2)].set_index("v")["p"]
        assert t1w2["9001"] == pytest.approx(0.5) and t1w2["10001"] == pytest.approx(0.5)

    def test_phi2_violation_triggered(self, join_session):
        # clean_⋈ triggers the violation between Mary and Jon (phone 12345)
        sess, _ = join_session
        ez = prob.cands_canonical(sess.table("emp"), "zip")
        assert set(ez["tid"]) == {1, 2}
        w1 = ez[(ez.tid == 1) & (ez.w == 1)].set_index("v")["p"]
        assert w1["10001"] == pytest.approx(0.5) and w1["10002"] == pytest.approx(0.5)

    def test_table4e_join_pairs(self, join_session):
        _, joined = join_session
        pairs = {(r[f"l_{TID}"], r["r_name"]) for r in joined.collect()}
        # Table 4e: Peter matches both city tuples; Mary and Jon match the
        # probabilistic t2 of Cities through candidate overlap
        assert {(0, "Peter"), (1, "Peter"), (1, "Mary"), (1, "Jon")} <= pairs
