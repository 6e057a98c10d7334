"""Incremental theta-join DC detection tests (paper §4.2, Algorithm 2)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import prob
from repro.core.constraints import DC, Atom
from repro.core.thetajoin import ThetaJoinCleaner
from repro.datagen.errors import inject_dc_errors, monotone_discount

DC_RULE = DC((Atom("salary", "<"), Atom("tax", ">")), name="dc_sal_tax")


def _brute_force(pdf: pd.DataFrame) -> set[tuple[int, int]]:
    out = set()
    vals = list(pdf[["salary", "tax"]].itertuples(index=True))
    for i, si, ti in vals:
        for j, sj, tj in vals:
            if i != j and si < sj and ti > tj:
                out.add((i, j))
    return out


@pytest.fixture(scope="module")
def dc_data(spark):
    g = np.random.default_rng(7)
    pdf = pd.DataFrame({"salary": (g.random(300) * 5000).round(0)})
    pdf["tax"] = monotone_discount(pdf["salary"].to_numpy(), levels=20)
    dirty, truth = inject_dc_errors(pdf, "salary", "tax", frac_rows=0.05, shift=0.5, seed=8)
    d = prob.spark_with_tid(spark, dirty)
    return dirty, truth, d


class TestDetection:
    def test_full_matrix_matches_brute_force(self, dc_data):
        dirty, _, d = dc_data
        theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        viol = theta.detect(None).toPandas()
        got = set(zip(viol["tid1"], viol["tid2"]))
        assert got == _brute_force(dirty)

    def test_incremental_union_equals_full(self, dc_data):
        dirty, _, d = dc_data
        full = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        all_pairs = set(
            zip(*full.detect(None).toPandas()[["tid1", "tid2"]].T.values.tolist())
        )
        inc = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        got = set()
        for b in range(inc.nb):
            v = inc.detect({b}).toPandas()
            got |= set(zip(v["tid1"], v["tid2"]))
        assert got == all_pairs

    def test_no_rescan_of_checked_pairs(self, dc_data):
        _, _, d = dc_data
        theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        theta.detect(None)
        n1 = theta.pairs_scanned
        theta.detect(None)
        assert theta.pairs_scanned == n1  # everything already checked

    def test_partition_pruning_happens(self, dc_data):
        _, _, d = dc_data
        theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        theta.detect(None)
        total_ordered_pairs = theta.nb * theta.nb
        assert theta.pairs_scanned < total_ordered_pairs  # some pairs pruned

    def test_clean_monotone_data_has_no_violations(self, spark):
        g = np.random.default_rng(9)
        pdf = pd.DataFrame({"salary": (g.random(200) * 1000).round(0)})
        pdf["tax"] = monotone_discount(pdf["salary"].to_numpy())
        d = prob.spark_with_tid(spark, pdf)
        theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        assert theta.detect(None).count() == 0


class TestAccuracyEstimation:
    def test_support_grows_with_checked_diagonal(self, dc_data):
        _, _, d = dc_data
        theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        _, s0 = theta.accuracy(set(), 10)
        theta.detect({0})
        _, s1 = theta.accuracy(set(), 10)
        assert s1 >= s0

    def test_accuracy_bounded(self, dc_data):
        _, _, d = dc_data
        theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        acc, sup = theta.accuracy({0}, 50)
        assert 0.0 <= acc <= 1.0 and 0.0 <= sup <= 1.0

    def test_dirtier_data_lower_estimated_accuracy(self, spark):
        g = np.random.default_rng(10)
        base = pd.DataFrame({"salary": (g.random(300) * 5000).round(0)})
        base["tax"] = monotone_discount(base["salary"].to_numpy(), levels=20)
        accs = []
        for frac in (0.01, 0.2):
            dirty, _ = inject_dc_errors(base, "salary", "tax", frac_rows=frac, shift=0.5, seed=11)
            d = prob.spark_with_tid(spark, dirty)
            theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
            acc, _ = theta.accuracy({0}, 30)
            accs.append(acc)
        assert accs[1] < accs[0]

    def test_bucket_of(self, dc_data):
        _, _, d = dc_data
        theta = ThetaJoinCleaner(d, DC_RULE, partitions=16)
        assert theta.bucket_of(float(theta.splits[0])) == 0
        assert theta.bucket_of(float(theta.splits[-1]) + 1) == theta.nb - 1


class TestConstruction:
    def test_two_atoms_required(self, dc_data):
        _, _, d = dc_data
        with pytest.raises(ValueError):
            ThetaJoinCleaner(d, DC((Atom("salary", "<"),)), partitions=4)

    def test_equality_atoms_rejected(self, dc_data):
        _, _, d = dc_data
        with pytest.raises(ValueError):
            ThetaJoinCleaner(d, DC((Atom("salary", "="), Atom("tax", "!="))), partitions=4)
