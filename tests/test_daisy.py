"""DaisySession integration tests: gradual cleaning, strategy switching,
incremental rule arrival, joins and aggregates (paper §6)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import prob
from repro.core.constraints import DC, FD, Atom
from repro.core.daisy import DaisySession
from repro.core.offline import offline_clean
from repro.core.planner import Aggregate, Filter, JoinSpec, Query
from repro.core.prob import TID, checked_col
from repro.datagen import ssb
from repro.datagen.errors import inject_fd_errors

PHI = FD(("orderkey",), "suppkey", name="phi")


@pytest.fixture(scope="module")
def small_session_inputs(spark, ssb_small):
    _, dirty, _ = ssb_small
    return prob.spark_with_tid(spark, dirty)


def _fresh(spark, d, **kw):
    return DaisySession(spark, {"lineorder": d}, {"lineorder": [PHI]}, **kw)


class TestSPFlow:
    @pytest.fixture(scope="class")
    def run(self, spark, small_session_inputs):
        sess = _fresh(spark, small_session_inputs, use_cost_model=False)
        results = []
        for lo, hi in [(1, 7), (8, 14), (15, 20)]:
            r = sess.execute(Query("lineorder", [Filter("suppkey", "between", lo, hi)]))
            results.append(r.count())
        return sess, results

    def test_gradual_cleaning_monotone(self, run):
        sess, _ = run
        checked = sess.table("lineorder").where(F.col(checked_col(PHI.name))).count()
        assert checked == sess.table("lineorder").count()  # workload covered all

    def test_records_kept(self, run):
        sess, _ = run
        assert len(sess.records) == 3
        assert all(r.answer > 0 for r in sess.records)

    def test_lemma_iteration_budget(self, run):
        sess, _ = run
        assert all(r.relax_iters <= 1 for r in sess.records)  # rhs filters

    def test_no_rerepair_on_repeat(self, spark, run):
        sess, _ = run
        r = sess.execute(Query("lineorder", [Filter("suppkey", "between", 1, 7)]))
        r.count()
        assert sess.records[-1].repaired == 0

    def test_results_probabilistic(self, run):
        sess, _ = run
        c = prob.cands_canonical(sess.table("lineorder"), "suppkey")
        assert len(c) > 0

    def test_plan_reports_incremental_then_full(self, spark, run):
        sess, _ = run
        q = Query("lineorder", [Filter("suppkey", "=", 1)])
        assert any(o.op == "clean_sigma" and o.placement == "after" for o in sess.plan(q))
        sess.fully_cleaned.add("lineorder")
        assert any(o.op == "clean_sigma" and o.placement == "before" for o in sess.plan(q))
        sess.fully_cleaned.discard("lineorder")


class TestIrrelevantQueries:
    def test_rule_free_attr_skips_cleaning(self, spark, small_session_inputs):
        # §4.1: the rule matters iff (X ∪ Y) ∩ (P ∪ W) ≠ ∅ — a query that
        # filters and projects only rule-free attributes skips cleaning
        sess = _fresh(spark, small_session_inputs, use_cost_model=False)
        r = sess.execute(
            Query("lineorder", [Filter("quantity", "=", 5)], project=["quantity"])
        )
        r.count()
        assert sess.records[0].repaired == 0
        assert sess.records[0].strategy == "no-rule"


class TestProjectionAndAggregates:
    def test_projection_carries_cands(self, spark, small_session_inputs):
        sess = _fresh(spark, small_session_inputs, use_cost_model=False)
        r = sess.execute(Query("lineorder", [Filter("suppkey", "=", 3)], project=["suppkey"]))
        assert prob.cands_col("suppkey") in r.columns

    def test_group_by_aggregate_after_cleaning(self, spark, small_session_inputs):
        sess = _fresh(spark, small_session_inputs, use_cost_model=False)
        q = Query(
            "lineorder",
            [Filter("suppkey", "between", 1, 4)],
            group_by=["suppkey"],
            aggs=[Aggregate("count", "*", "c")],
        )
        out = sess.execute(q).toPandas()
        assert set(out.columns) == {"suppkey", "c"}
        assert (out["c"] > 0).all()


class TestCostModelSwitch:
    def test_switch_fires_and_finishes_cleaning(self, spark, ssb_small):
        _, dirty, _ = ssb_small
        d = prob.spark_with_tid(spark, dirty)
        sess = _fresh(spark, d, use_cost_model=True, cost_safety=1e-6)
        sess.execute(Query("lineorder", [Filter("suppkey", "=", 1)])).count()
        assert sess.switched_at == 1
        assert "lineorder" in sess.fully_cleaned
        # after the switch the whole table is checked and equals offline
        t = sess.table("lineorder")
        assert t.where(~F.col(checked_col(PHI.name))).count() == 0
        off = offline_clean(d, [PHI], mode="vectorized")
        pd.testing.assert_frame_equal(
            prob.cands_canonical(t, "suppkey"), prob.cands_canonical(off.table, "suppkey")
        )

    def test_no_switch_with_huge_safety(self, spark, small_session_inputs):
        sess = _fresh(spark, small_session_inputs, use_cost_model=True, cost_safety=1e9)
        sess.execute(Query("lineorder", [Filter("suppkey", "=", 1)])).count()
        assert sess.switched_at is None

    def test_post_switch_queries_do_no_cleaning(self, spark, ssb_small):
        _, dirty, _ = ssb_small
        d = prob.spark_with_tid(spark, dirty)
        sess = _fresh(spark, d, use_cost_model=True, cost_safety=1e-6)
        sess.execute(Query("lineorder", [Filter("suppkey", "=", 1)])).count()
        sess.execute(Query("lineorder", [Filter("suppkey", "=", 2)])).count()
        assert sess.records[1].repaired == 0 and sess.records[1].strategy == "clean"


class TestAddRules:
    def test_incremental_rule_arrival_matches_joint_offline(self, spark):
        pdf = pd.DataFrame(
            {
                "zip": ["z1", "z1", "z2", "z2", "z1"],
                "city": ["LA", "LA", "SF", "LA", "LA"],
                "state": ["CA", "CA", "CA", "WA", "NV"],
            }
        )
        fa = FD(("zip",), "state", name="phi_a")
        fb = FD(("city",), "state", name="phi_b")
        d = prob.spark_with_tid(spark, pdf)
        sess = DaisySession(spark, {"t": d}, {"t": [fa]}, use_cost_model=False)
        sess.execute(Query("t", [])).count()  # cleans under phi_a
        sess.add_rules("t", [fb])
        sess.execute(Query("t", [])).count()  # re-merges under phi_a + phi_b
        off = offline_clean(prob.spark_with_tid(spark, pdf), [fa, fb], mode="vectorized")
        got = prob.cands_canonical(sess.table("t"), "state")
        exp = prob.cands_canonical(off.table, "state")
        pd.testing.assert_frame_equal(
            got[got.w == 1].reset_index(drop=True), exp[exp.w == 1].reset_index(drop=True)
        )


class TestJoinQueries:
    def test_join_cleans_both_sides(self, spark):
        lo = ssb.lineorder_pdf(n_rows=600, n_orderkeys=60, n_suppkeys=12)
        lo_d, _ = inject_fd_errors(lo, ("orderkey",), "suppkey", frac_rows=0.15, seed=9)
        sup = ssb.supplier_pdf(n_suppkeys=12, rows_per_supp=3)
        sup_d, _ = inject_fd_errors(sup, ("address",), "suppkey", frac_rows=0.4, seed=10)
        psi = FD(("address",), "suppkey", name="psi")
        l = prob.spark_with_tid(spark, lo_d)
        s = prob.spark_with_tid(spark, sup_d)
        sess = DaisySession(
            spark,
            {"lineorder": l, "supplier": s},
            {"lineorder": [PHI], "supplier": [psi]},
            use_cost_model=False,
        )
        q = Query(
            "lineorder",
            [Filter("suppkey", "between", 1, 6)],
            join=JoinSpec("supplier", "suppkey", "suppkey"),
        )
        out = sess.execute(q)
        assert out.count() > 0
        assert prob.cands_canonical(sess.table("lineorder"), "suppkey")["tid"].nunique() > 0
        assert prob.cands_canonical(sess.table("supplier"), "suppkey")["tid"].nunique() > 0

    def test_dc_rule_sp_query(self, spark):
        import numpy as np

        from repro.datagen.errors import inject_dc_errors, monotone_discount

        g = np.random.default_rng(3)
        pdf = pd.DataFrame({"extendedprice": (g.random(300) * 5000).round(0)})
        pdf["discount"] = monotone_discount(pdf["extendedprice"].to_numpy(), levels=15)
        dirty, _ = inject_dc_errors(pdf, "extendedprice", "discount", frac_rows=0.03, seed=4)
        dc = DC((Atom("extendedprice", "<"), Atom("discount", ">")), name="dcr")
        d = prob.spark_with_tid(spark, dirty)
        sess = DaisySession(
            spark, {"t": d}, {"t": [dc]}, use_cost_model=False, dc_partitions=16
        )
        r = sess.execute(Query("t", [Filter("extendedprice", "between", 1000, 2000)]))
        r.count()
        assert sess.records[0].dc_mode in ("partial", "full")
        assert "t" in sess.dc_repairs
