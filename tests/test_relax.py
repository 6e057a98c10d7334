"""Algorithm 1 (query-result relaxation) tests, oracle-checked with DuckDB."""
import duckdb
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import prob, relax
from repro.core.constraints import FD
from repro.core.prob import TID


def _tids(df):
    return sorted(r[TID] for r in df.select(TID).collect())


class TestCitiesExample:
    """Examples 2-3 over Table 2a."""

    def test_closure_pulls_whole_cluster_rhs_filter(self, cities, phi1):
        A = cities.where(prob.qualifies(cities, "city", "=", "Los Angeles"))
        extra, iters = relax.relax_fd(cities, A, phi1, max_iter=0)
        # Example 2 chain: +(9001,SF) by lhs, +(10001,SF) by rhs, +(10001,NY) by lhs
        assert _tids(extra) == [1, 3, 4]
        assert iters == 3

    def test_one_iteration_covers_qualifying_groups(self, cities, phi1):
        # Lemma 1: one iteration suffices for accurate fixes of the
        # qualifying tuples under an rhs filter — it adds the same-lhs tuples
        A = cities.where(prob.qualifies(cities, "city", "=", "Los Angeles"))
        extra, iters = relax.relax_fd(cities, A, phi1, filter_side="rhs")
        assert iters == 1
        assert _tids(extra) == [1]  # (9001, San Francisco)

    def test_lhs_filter_two_iterations(self, cities, phi1):
        # Example 3: zip = 9001; iteration 1 adds (10001,SF) via rhs match,
        # iteration 2 adds (10001,NY) via the now-present lhs 10001
        A = cities.where(prob.qualifies(cities, "zip", "=", "9001"))
        extra, iters = relax.relax_fd(cities, A, phi1, filter_side="lhs")
        assert iters == 2
        assert _tids(extra) == [3, 4]

    def test_no_extras_when_answer_is_whole_dataset(self, cities, phi1):
        extra, _ = relax.relax_fd(cities, cities, phi1, max_iter=0)
        assert extra.count() == 0


class TestOracle:
    """One-iteration relaxation equals the correlated-tuple SQL on DuckDB."""

    @pytest.mark.parametrize("lo,hi", [(1, 5), (6, 10), (1, 20)])
    def test_rhs_filter_matches_sql(self, spark, ssb_small, lo, hi):
        _, dirty, _ = ssb_small
        d = prob.spark_with_tid(spark, dirty)
        fd = FD(("orderkey",), "suppkey", name="phi")
        A = d.where(prob.qualifies(d, "suppkey", "between", lo, hi)).localCheckpoint(eager=True)
        extra, _ = relax.relax_fd(d, A, fd, filter_side="rhs")
        con = duckdb.connect()
        con.register("d", dirty.reset_index(drop=True).reset_index(names="tid"))
        # iteration 1 of Algorithm 1: lhs matches first, then rhs matches
        # against the answer's value snapshots, both from the unvisited pool
        expected = con.execute(
            f"""
            WITH a AS (SELECT * FROM d WHERE suppkey BETWEEN {lo} AND {hi}),
            unv AS (SELECT * FROM d WHERE tid NOT IN (SELECT tid FROM a)),
            e1 AS (SELECT * FROM unv WHERE orderkey IN (SELECT orderkey FROM a)),
            e2 AS (SELECT * FROM unv WHERE tid NOT IN (SELECT tid FROM e1)
                   AND suppkey IN (SELECT suppkey FROM a))
            SELECT tid FROM e1 UNION SELECT tid FROM e2 ORDER BY tid
            """
        ).fetchdf()
        con.close()
        assert _tids(extra) == expected["tid"].tolist()

    def test_closure_is_connected_component(self, spark, cities_pdf, phi1):
        # the closure of any seed inside a connected cluster is the cluster
        d = prob.spark_with_tid(spark, cities_pdf)
        d = prob.ensure_cands(d, ["zip", "city"])
        A = d.where(F.col(TID) == 3)  # (10001, San Francisco)
        extra, _ = relax.relax_fd(d, A, phi1, max_iter=0)
        assert _tids(extra) == [0, 1, 2, 4]


class TestCompositeLhs:
    def test_composite_lhs_match(self, spark):
        pdf = pd.DataFrame(
            {
                "s": [1, 1, 2, 2],
                "c": [7, 7, 7, 8],
                "name": ["a", "b", "a", "z"],
            }
        )
        d = prob.spark_with_tid(spark, pdf)
        d = prob.ensure_cands(d, ["name"])
        fd = FD(("s", "c"), "name")
        A = d.where(F.col(TID) == 0)  # group (1,7) — row 1 shares it
        extra, _ = relax.relax_fd(d, A, fd, filter_side="lhs")
        # iteration 1: +row1 (same composite lhs) and +row2 (same rhs 'a');
        # iteration 2: +row3? no — (2,8) shares neither lhs (2,7)≠(2,8) nor rhs
        assert 1 in _tids(extra) and 2 in _tids(extra) and 3 not in _tids(extra)


class TestProbAwareMatching:
    def test_candidate_values_match(self, spark, phi1, cities_pdf):
        # a tuple whose *candidate* zip matches the answer's zip is pulled in
        d = prob.spark_with_tid(spark, cities_pdf)
        d = prob.ensure_cands(d, ["zip", "city"])
        arr = F.array(
            F.struct(F.lit("9001").alias("v"), F.lit(0.5).alias("p"), F.lit(2).alias("w")),
            F.struct(F.lit("10001").alias("v"), F.lit(0.5).alias("p"), F.lit(2).alias("w")),
        )
        d = d.withColumn(
            prob.cands_col("zip"),
            F.when(F.col(TID) == 3, arr).otherwise(F.col(prob.cands_col("zip"))),
        )
        A = d.where(F.col(TID).isin([0, 2]))  # zip 9001 rows
        extra, _ = relax.relax_fd(d, A, phi1, max_iter=1)
        assert 3 in _tids(extra) and 1 in _tids(extra)
