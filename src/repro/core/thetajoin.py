"""Incremental partitioned theta-join for general DCs (paper §4.2, Alg. 2).

The cartesian product of the table with itself is mapped to a matrix
(Okcan & Riedewald [22]): both axes are range-bucketed on the attribute of
the DC's first atom into ``g = √p`` quantile buckets, so the matrix has
``p = g²`` partitions.  Violation detection over a region then

- prunes whole partitions whose bucket boundary ranges cannot satisfy the
  atoms (e.g. for ``t1.x < t2.x`` a partition (r, c) with ``lo_r ≥ hi_c``
  on the relevant orientation),
- prunes intra-partition pairs by tightening the value ranges before the
  pairwise check (Fig 2's example), and
- skips symmetric duplicates by checking only unordered bucket pairs
  (r ≤ c) with both pair orientations.

Incrementality: a cleaner instance remembers the set of checked bucket
pairs; a query only pays for the unchecked pairs its result touches
(§4.2: "the matrix subset involves the query result and the unseen part
of the dataset").  ``estimate_errors`` is Algorithm 2's boundary-overlap
estimator, with the support metric over diagonal partitions.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.constraints import DC
from repro.core.prob import TID


@dataclass
class BucketInfo:
    idx: int
    x_lo: float
    x_hi: float
    y_lo: float
    y_hi: float
    count: int


class ThetaJoinCleaner:
    """Matrix-partitioned, incremental violation detector for a 2-atom DC.

    Supports DCs of the shape ``¬(t1.x <op1> t2.x ∧ t1.y <op2> t2.y)`` with
    inequality ops — the paper's running example
    ``¬(t1.salary < t2.salary ∧ t1.tax > t2.tax)``.
    """

    def __init__(self, dataset: DataFrame, dc: DC, *, partitions: int = 64):
        if len(dc.atoms) != 2:
            raise ValueError("ThetaJoinCleaner handles two-atom DCs")
        self.dc = dc
        self.x = dc.atoms[0].attr
        self.y = dc.atoms[1].attr
        self.opx = dc.atoms[0].op
        self.opy = dc.atoms[1].op
        if self.opx not in ("<", "<=", ">", ">=") or self.opy not in ("<", "<=", ">", ">="):
            raise ValueError("atoms must be inequalities")
        self.g = max(1, int(math.sqrt(partitions)))
        qs = [i / self.g for i in range(self.g + 1)]
        cuts = dataset.approxQuantile(self.x, qs, 0.001)
        # de-duplicate cut points (heavy hitters collapse quantiles)
        splits = sorted(set(cuts))
        self.splits = splits
        self.nb = max(1, len(splits) - 1)
        bucket = self._bucket_col(F.col(self.x))
        self.data = (
            dataset.select(TID, self.x, self.y)
            .withColumn("__bx", bucket)
            .localCheckpoint(eager=True)
        )
        rows = (
            self.data.groupBy("__bx")
            .agg(
                F.min(self.x).alias("xlo"),
                F.max(self.x).alias("xhi"),
                F.min(self.y).alias("ylo"),
                F.max(self.y).alias("yhi"),
                F.count("*").alias("cnt"),
            )
            .collect()
        )
        self.buckets: dict[int, BucketInfo] = {
            int(r["__bx"]): BucketInfo(
                int(r["__bx"]), r["xlo"], r["xhi"], r["ylo"], r["yhi"], int(r["cnt"])
            )
            for r in rows
        }
        # per-bucket sorted y values for the Alg. 2 estimator (driver-side;
        # at cluster scale this would be a t-digest/quantile sketch)
        import numpy as _np

        ys = self.data.select("__bx", self.y).toPandas()
        self._bucket_ys = {
            int(b): _np.sort(g[self.y].to_numpy()) for b, g in ys.groupby("__bx")
        }
        self.checked: set[tuple[int, int]] = set()
        self.pairs_scanned = 0

    # -- bucket helpers ----------------------------------------------------
    def _bucket_col(self, col: F.Column):
        """CASE-WHEN ladder assigning each value its quantile bucket index."""
        b = None
        for i in range(self.nb):
            hi = self.splits[i + 1]
            cond = col < F.lit(hi) if i < self.nb - 1 else F.lit(True)
            b = F.when(cond, F.lit(i)) if b is None else b.when(cond, F.lit(i))
        return b

    def bucket_of(self, v: float) -> int:
        for i in range(self.nb):
            if v < self.splits[i + 1] or i == self.nb - 1:
                return i
        return self.nb - 1

    # -- feasibility pruning ----------------------------------------------
    def feasible(self, r: int, c: int) -> bool:
        """Can any (t1 ∈ bucket r, t2 ∈ bucket c) pair violate the DC?"""
        br, bc = self.buckets.get(r), self.buckets.get(c)
        if br is None or bc is None or br.count == 0 or bc.count == 0:
            return False

        def rng_ok(lo1, hi1, op, lo2, hi2):
            if op in ("<", "<="):
                return lo1 < hi2 or (op == "<=" and lo1 <= hi2)
            return hi1 > lo2 or (op == ">=" and hi1 >= lo2)

        return rng_ok(br.x_lo, br.x_hi, self.opx, bc.x_lo, bc.x_hi) and rng_ok(
            br.y_lo, br.y_hi, self.opy, bc.y_lo, bc.y_hi
        )

    def _pair_violations(self, r: int, c: int) -> DataFrame:
        """Violating (t1, t2) pairs with t1 in bucket r, t2 in bucket c."""
        br, bc = self.buckets[r], self.buckets[c]
        left = self.data.where(F.col("__bx") == r)
        right = self.data.where(F.col("__bx") == c)
        # intra-partition pruning (Fig 2): tighten ranges per condition
        if self.opx in ("<", "<="):
            left = left.where(F.col(self.x) < F.lit(bc.x_hi + 1e-12))
            right = right.where(F.col(self.x) > F.lit(br.x_lo - 1e-12))
        else:
            left = left.where(F.col(self.x) > F.lit(bc.x_lo - 1e-12))
            right = right.where(F.col(self.x) < F.lit(br.x_hi + 1e-12))
        if self.opy in (">", ">="):
            left = left.where(F.col(self.y) > F.lit(bc.y_lo - 1e-12))
            right = right.where(F.col(self.y) < F.lit(br.y_hi + 1e-12))
        else:
            left = left.where(F.col(self.y) < F.lit(bc.y_hi + 1e-12))
            right = right.where(F.col(self.y) > F.lit(br.y_lo - 1e-12))
        l = left.select(
            F.col(TID).alias("tid1"), F.col(self.x).alias("x1"), F.col(self.y).alias("y1")
        )
        rr = right.select(
            F.col(TID).alias("tid2"), F.col(self.x).alias("x2"), F.col(self.y).alias("y2")
        )
        px = {"<": F.col("x1") < F.col("x2"), "<=": F.col("x1") <= F.col("x2"),
              ">": F.col("x1") > F.col("x2"), ">=": F.col("x1") >= F.col("x2")}[self.opx]
        py = {"<": F.col("y1") < F.col("y2"), "<=": F.col("y1") <= F.col("y2"),
              ">": F.col("y1") > F.col("y2"), ">=": F.col("y1") >= F.col("y2")}[self.opy]
        out = l.crossJoin(rr).where(px & py)
        if r == c:
            out = out.where(F.col("tid1") != F.col("tid2"))
        return out

    def detect(self, bucket_rows: set[int] | None = None) -> DataFrame:
        """Violations for all unchecked feasible pairs touching ``bucket_rows``.

        ``None`` means the full matrix (offline mode).  Only unordered pairs
        are checked; both orientations are covered because (r, c) and (c, r)
        are both generated when their row-bucket is in scope.
        """
        scope = set(range(self.nb)) if bucket_rows is None else set(bucket_rows)
        todo: list[tuple[int, int]] = []
        candidates: list[tuple[int, int]] = []
        for r in scope:
            for c in range(self.nb):
                candidates.append((r, c))
                candidates.append((c, r))  # both orientations touch the result
        for pair in candidates:
            if pair in self.checked:
                continue
            self.checked.add(pair)
            if self.feasible(*pair):
                todo.append(pair)
        self.pairs_scanned += len(todo)
        if not todo:
            return self.data.sparkSession.createDataFrame(
                [], "tid1 long, x1 double, y1 double, tid2 long, x2 double, y2 double"
            )
        out = None
        for r, c in todo:
            v = self._pair_violations(r, c)
            out = v if out is None else out.unionByName(v)
        return out.localCheckpoint(eager=True)

    # -- Algorithm 2 -------------------------------------------------------
    def estimate_errors(self) -> dict[int, float]:
        """Per-row-bucket estimated violating-*tuple* counts (Alg. 2 line 6).

        For each ordered bucket pair whose x-ranges allow the x-atom, the
        y-boundary overlap identifies the candidate violators: the tuples of
        the row bucket whose y strictly exceeds (for a ``>`` y-atom) the
        partner bucket's minimum y.  Counting with the per-bucket y
        quantiles makes the estimate exact-zero on DC-satisfying monotone
        data while outlier dirty values surface immediately — which is what
        lets the 0.2%/2% versions of Fig 10 stay on partial cleaning and
        pushes the 20% version to a full clean.
        """
        import numpy as _np

        est: dict[int, float] = {i: 0.0 for i in range(self.nb)}
        strict_gt = self.opy in (">", ">=")
        for r in range(self.nb):
            ys_r = self._bucket_ys.get(r)
            if ys_r is None or len(ys_r) == 0:
                continue
            for c in range(self.nb):
                if r == c or not self.feasible(r, c):
                    continue
                bc = self.buckets.get(c)
                if bc is None:
                    continue
                if strict_gt:
                    # candidate violators in r: y strictly above c's min y
                    n_above = len(ys_r) - _np.searchsorted(ys_r, bc.y_lo, side="right")
                    est[r] += float(n_above)
                else:
                    n_below = _np.searchsorted(ys_r, bc.y_hi, side="left")
                    est[r] += float(n_below)
        # a tuple violating against many buckets is one erroneous tuple
        for r in est:
            est[r] = est[r] / max(1, self.nb - 1)
        return est

    def accuracy(self, result_buckets: set[int], result_size: int) -> tuple[float, float]:
        """(estimated accuracy, support) for a query answer (Alg. 2 lines 4-7).

        Accuracy is ``|qa| / (|qa| + est_errors_outside)`` — the Fig 10
        narrative's reading ("predicts 23% accuracy → cleans the whole
        dataset"); support is the fraction of checked diagonal partitions.
        """
        est = self.estimate_errors()
        errors = sum(v for b, v in est.items() if b not in result_buckets)
        acc = result_size / (result_size + errors) if (result_size + errors) > 0 else 1.0
        diag_total = self.nb
        diag_checked = sum(1 for i in range(self.nb) if (i, i) in self.checked)
        support = diag_checked / max(1, diag_total)
        return acc, support
