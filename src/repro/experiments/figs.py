"""Figure experiments 5/7/9/10/11/12 as table-ized benchmarks (paper §7.1-2).

Figures are out of the reproduction's plotting scope, but these workloads
carry the paper's core performance claims, so each is reproduced as a table
of numbers: which system wins and by roughly what factor.
All scales are reduced (DESIGN.md §4-5): lineorder 24K rows by default,
20-query workloads, offline per-group batch 10.
"""
from __future__ import annotations

import numpy as np

from pyspark.sql import SparkSession

from repro.core import prob
from repro.core.constraints import DC, FD, Atom
from repro.core.daisy import DaisySession
from repro.core.offline import offline_clean
from repro.core.planner import Filter, Query
from repro.datagen import ssb
from repro.datagen.errors import (
    inject_dc_errors,
    inject_fd_errors,
    monotone_discount,
)
from repro.experiments.common import run_daisy_workload, run_offline_workload
from repro.workloads import join_queries, mixed_random_queries, sp_range_queries

PHI = FD(("orderkey",), "suppkey", name="phi")
PSI = FD(("address",), "suppkey", name="psi")


def _dirty_lineorder(n_rows, n_orderkeys, n_suppkeys, *, frac_groups=1.0, seed=7):
    lo = ssb.lineorder_pdf(
        n_rows=n_rows, n_orderkeys=n_orderkeys, n_suppkeys=n_suppkeys, seed=seed
    )
    dirty, truth = inject_fd_errors(
        lo, ("orderkey",), "suppkey", frac_groups=frac_groups, frac_rows=0.1, seed=seed + 1
    )
    return dirty, truth


def _compare(spark, dirty, rules, queries, *, batch_size=10, use_cost_model=False,
             table="lineorder", join_tables=None, cost_safety=1.0):
    sess = DaisySession(
        spark,
        {table: prob.spark_with_tid(spark, dirty), **(join_tables or {})},
        {table: rules, **{k: [] for k in (join_tables or {})}},
        use_cost_model=use_cost_model,
        cost_safety=cost_safety,
    )
    daisy = run_daisy_workload(sess, queries)
    off = run_offline_workload(
        spark,
        prob.spark_with_tid(spark, dirty),
        rules,
        queries,
        table=table,
        batch_size=batch_size,
        join_tables={k: sess.tables[k] for k in (join_tables or {})},
    )
    return {
        "daisy": round(daisy["seconds"], 1),
        "offline": round(off["seconds"], 1),
        "offline_passes": off["passes"],
        "switched_at": daisy["switched_at"],
    }


# ---------------------------------------------------------------------- #
def run_fig5(spark: SparkSession, *, n_rows=8_000, n_queries=8) -> dict:
    """SP cost vs orderkey cardinality (5K/10K/100K in the paper, scaled).

    Queries carry range filters on the rhs (suppkey) with fixed selectivity;
    paper: Daisy ~2× faster than offline, both grow with cardinality.
    """
    out = {"paper": "Daisy ~2x faster than offline at all orderkey counts", "measured": {}}
    for n_ok in (300, 600, 1200):
        dirty, _ = _dirty_lineorder(n_rows, n_ok, 120)
        queries = sp_range_queries("suppkey", 1, 120, n_queries)
        out["measured"][f"orderkeys={n_ok}"] = _compare(
            spark, dirty, [PHI], queries, batch_size=5
        )
    return out


def run_fig7(spark: SparkSession, *, n_rows=8_000, n_queries=12) -> dict:
    """Cost-model strategy switch under low suppkey selectivity.

    90 random-selectivity queries in the paper; Daisy-with-cost-model beats
    both pure incremental and offline by switching mid-workload.
    """
    dirty, _ = _dirty_lineorder(n_rows, 2400, 24)  # low suppkey selectivity → p large
    queries = mixed_random_queries("orderkey", 1, 2400, n_queries, seed=3)
    out = {"paper": "Daisy(cost model) < offline < incremental; switch mid-workload",
           "measured": {}}
    out["measured"]["incremental"] = _compare(spark, dirty, [PHI], queries)
    # safety 0.3: the calibrated switch threshold for the high-p regime
    cm = _compare(spark, dirty, [PHI], queries, use_cost_model=True, cost_safety=0.3)
    out["measured"]["daisy_cost_model"] = cm
    return out


def run_fig9(spark: SparkSession, *, n_rows=8_000, n_queries=8) -> dict:
    """Increasing violation fractions (20%-80% of orderkeys erroneous)."""
    out = {"paper": "Daisy faster at every violation rate; gap grows with errors",
           "measured": {}}
    # the paper sweeps 20/40/60/80%; the endpoints carry the shape claim
    for frac in (0.2, 0.8):
        dirty, _ = _dirty_lineorder(n_rows, 1200, 120, frac_groups=frac)
        queries = sp_range_queries("suppkey", 1, 120, n_queries)
        out["measured"][f"violations={int(frac*100)}%"] = _compare(
            spark, dirty, [PHI], queries, batch_size=4
        )
    return out


def run_fig10(spark: SparkSession, *, n_rows=5_000, n_queries=8) -> dict:
    """General DC with inequality conditions at 0.2% / 2% / 20% violations.

    Paper: Daisy 1.3× faster at 0.2%/2% (99%/80% accurate); at 20% the
    accuracy estimate triggers full cleaning (100% accurate, offline-equal
    cost).  Accuracy here = recall of offline-detected violating pairs.
    """
    dc = DC((Atom("extendedprice", "<"), Atom("discount", ">")), name="dc")
    base = ssb.lineorder_pdf(n_rows=n_rows, n_orderkeys=n_rows // 10, n_suppkeys=50, seed=13)
    base = base.drop(columns=["discount"])
    # strictly increasing discount: a step function would make *any*
    # perturbation violate against a whole constant-discount level, so the
    # paper's low-violation regimes (a few dirty values causing few
    # inconsistencies) would be unreachable
    base["discount"] = monotone_discount(base["extendedprice"].to_numpy(), levels=n_rows)
    out = {"paper": {"0.2%": "1.3x faster, 99% acc", "2%": "1.3x faster, 80% acc",
                     "20%": "full clean, 100% acc"}, "measured": {}}
    lo, hi = float(base["extendedprice"].min()), float(base["extendedprice"].max())
    edges = np.linspace(lo, hi, n_queries + 1)
    # the paper fixes the dirty values and varies the violations they
    # *induce*: local shifts conflict with a few nearby tuples (0.2% / 2%
    # versions; violating tuples ≈ edits × band where band = shift·n), while
    # outlier values conflict across matrix partitions (20% version)
    for label, frac, shift in (
        ("0.2%", 0.0006, 0.002),
        ("2%", 0.002, 0.01),
        ("20%", 0.02, 0.6),
    ):
        dirty, _ = inject_dc_errors(base, "extendedprice", "discount",
                                    frac_rows=frac, shift=shift, seed=17)
        import time as _time

        d = prob.spark_with_tid(spark, dirty)
        sess = DaisySession(spark, {"t": d}, {"t": [dc]}, use_cost_model=False,
                            dc_partitions=36, accuracy_threshold=0.5)
        t0 = _time.time()
        for i in range(n_queries):
            sess.execute(
                Query("t", [Filter("extendedprice", "between", float(edges[i]), float(edges[i + 1]))])
            ).count()
        daisy_s = _time.time() - t0
        daisy_pairs = sess.dc_repairs["t"].select("tid").distinct().count() if "t" in sess.dc_repairs else 0
        t0 = _time.time()
        off = offline_clean(prob.spark_with_tid(spark, dirty), [dc], dc_partitions=36)
        off_pairs = off.dc_repairs.select("tid").distinct().count() if off.dc_repairs is not None else 0
        out["measured"][label] = {
            "daisy": round(daisy_s, 1),
            "offline": round(off.seconds, 1),
            "accuracy_vs_offline": round(daisy_pairs / off_pairs, 3) if off_pairs else 1.0,
            "modes": [r.dc_mode for r in sess.records],
        }
    return out


def run_fig11(spark: SparkSession, *, n_rows=8_000, n_queries=8) -> dict:
    """SPJ workload: lineorder (φ) ⋈ supplier (ψ) on suppkey."""
    dirty, _ = _dirty_lineorder(n_rows, 1200, 60)
    sup = ssb.supplier_pdf(n_suppkeys=60, rows_per_supp=3)
    sup_d, _ = inject_fd_errors(sup, ("address",), "suppkey", frac_rows=0.3, seed=19)
    queries = join_queries("suppkey", 1, 60, n_queries)
    import time as _time

    sess = DaisySession(
        spark,
        {"lineorder": prob.spark_with_tid(spark, dirty),
         "supplier": prob.spark_with_tid(spark, sup_d)},
        {"lineorder": [PHI], "supplier": [PSI]},
        use_cost_model=False,
    )
    daisy = run_daisy_workload(sess, queries)
    # offline: clean both tables fully, then run the joins probabilistically
    t0 = _time.time()
    off_l = offline_clean(prob.spark_with_tid(spark, dirty), [PHI],
                          mode="per_group", batch_size=10)
    off_s = offline_clean(prob.spark_with_tid(spark, sup_d), [PSI],
                          mode="per_group", batch_size=10)
    from repro.core.operators import run_query

    for q in queries:
        run_query({"lineorder": off_l.table, "supplier": off_s.table}, q).count()
    off_seconds = _time.time() - t0
    return {
        "paper": "Daisy beats offline (correlated-tuple pruning + incremental join)",
        "measured": {
            "daisy": round(daisy["seconds"], 1),
            "offline": round(off_seconds, 1),
            "offline_passes": off_l.passes + off_s.passes,
        },
    }


def run_fig12(spark: SparkSession, *, n_rows=8_000, n_queries=12) -> dict:
    """Mixed SP + SPJ workload with the cost-model switch (paper Fig 12)."""
    dirty, _ = _dirty_lineorder(n_rows, 2400, 24)
    sup = ssb.supplier_pdf(n_suppkeys=24, rows_per_supp=3)
    sp = mixed_random_queries("orderkey", 1, 2400, n_queries - n_queries // 3, seed=23)
    jq = join_queries("suppkey", 1, 24, n_queries // 3)
    queries = [q for pair in zip(sp, jq + sp) for q in pair][:n_queries]
    out = {"paper": "switch predicted after ~1/3 of workload; beats both baselines",
           "measured": {}}
    for label, use_cm in (("incremental", False), ("daisy_cost_model", True)):
        sess = DaisySession(
            spark,
            {"lineorder": prob.spark_with_tid(spark, dirty),
             "supplier": prob.spark_with_tid(spark, sup)},
            {"lineorder": [PHI], "supplier": []},
            use_cost_model=use_cm,
            cost_safety=0.3,
        )
        r = run_daisy_workload(sess, queries)
        out["measured"][label] = {
            "seconds": round(r["seconds"], 1),
            "switched_at": r["switched_at"],
        }
    off = run_offline_workload(
        spark, prob.spark_with_tid(spark, dirty), [PHI], sp, table="lineorder",
        batch_size=10,
    )
    out["measured"]["offline"] = {"seconds": round(off["seconds"], 1)}
    return out
