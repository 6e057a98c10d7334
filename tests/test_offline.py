"""Offline baseline tests (paper §7's comparison system)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import prob
from repro.core.constraints import DC, FD, Atom
from repro.core.offline import offline_clean
from repro.core.prob import TID, checked_col

PHI = FD(("orderkey",), "suppkey", name="phi")


@pytest.fixture(scope="module")
def dirty_df(spark, ssb_small):
    _, dirty, _ = ssb_small
    return prob.spark_with_tid(spark, dirty)


class TestVectorized:
    def test_all_dirty_tuples_repaired(self, dirty_df, ssb_small):
        _, dirty, _ = ssb_small
        off = offline_clean(dirty_df, [PHI], mode="vectorized")
        nun = dirty.groupby("orderkey")["suppkey"].nunique()
        expected = int(dirty["orderkey"].isin(nun[nun > 1].index).sum())
        assert off.repaired == expected
        got = prob.cands_canonical(off.table, "suppkey")
        assert got["tid"].nunique() == expected

    def test_everything_checked(self, dirty_df):
        off = offline_clean(dirty_df, [PHI], mode="vectorized")
        assert off.table.where(~F.col(checked_col(PHI.name))).count() == 0

    def test_clean_data_noop(self, spark, ssb_small):
        clean, _, _ = ssb_small
        d = prob.spark_with_tid(spark, clean)
        off = offline_clean(d, [PHI], mode="vectorized")
        assert off.repaired == 0

    def test_dc_normalized_to_fd(self, dirty_df):
        dc = DC((Atom("orderkey", "="), Atom("suppkey", "!=")), name="phi")
        off = offline_clean(dirty_df, [dc], mode="vectorized")
        assert off.repaired > 0


class TestPerGroup:
    def test_equals_vectorized(self, dirty_df):
        a = offline_clean(dirty_df, [PHI], mode="vectorized")
        b = offline_clean(dirty_df, [PHI], mode="per_group", batch_size=40)
        pd.testing.assert_frame_equal(
            prob.cands_canonical(a.table, "suppkey"),
            prob.cands_canonical(b.table, "suppkey"),
        )
        pd.testing.assert_frame_equal(
            prob.cands_canonical(a.table, "orderkey"),
            prob.cands_canonical(b.table, "orderkey"),
        )

    def test_pass_count_scales_with_groups(self, dirty_df):
        b40 = offline_clean(dirty_df, [PHI], mode="per_group", batch_size=40)
        b80 = offline_clean(dirty_df, [PHI], mode="per_group", batch_size=80)
        assert b40.passes > b80.passes  # smaller batches → more passes

    def test_time_budget_reports_timeout(self, dirty_df):
        off = offline_clean(
            dirty_df, [PHI], mode="per_group", batch_size=1, time_budget=0.0
        )
        assert off.timed_out

    def test_unknown_mode_rejected(self, dirty_df):
        with pytest.raises(ValueError):
            offline_clean(dirty_df, [PHI], mode="nope")


class TestGeneralDC:
    def test_dc_detect_and_fixes(self, spark):
        import numpy as np

        from repro.datagen.errors import inject_dc_errors, monotone_discount

        g = np.random.default_rng(5)
        pdf = pd.DataFrame({"salary": (g.random(200) * 4000).round(0)})
        pdf["tax"] = monotone_discount(pdf["salary"].to_numpy(), levels=12)
        dirty, _ = inject_dc_errors(pdf, "salary", "tax", frac_rows=0.05, seed=6)
        d = prob.spark_with_tid(spark, dirty)
        dc = DC((Atom("salary", "<"), Atom("tax", ">")), name="dc")
        off = offline_clean(d, [dc], dc_partitions=16)
        assert off.dc_repairs is not None and off.repaired > 0
