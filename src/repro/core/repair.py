"""Probabilistic FD repair (paper §4.1, §4.3).

For a tuple ``t`` in a violating group of FD ``lhs → rhs``, repair produces
attribute-level candidates in two possible worlds:

- world 1 (lhs kept): rhs candidates ``RHS`` = rhs values of tuples sharing
  ``t``'s lhs, with conditional probabilities ``P(c_rhs | t_lhs)``; the lhs
  cell keeps ``t.lhs`` (probability 1 in this world);
- world ``2+i`` for rule ``i`` (rhs kept): lhs candidates ``LHS`` = lhs
  values of tuples sharing ``t``'s rhs with ``P(c_lhs | t_rhs)``; the rhs
  cell keeps ``t.rhs``.

Multiple rules with the same rhs attribute merge their world-1 candidate
sets with union-group probabilities ``P(X | Y ∪ Z)`` (§4.3); Lemma 4's
commutativity holds by construction because the repair for a tuple is a
pure function of provenance values and the *set* of rules it is dirty
under — re-running with rules in any order yields the same cells.

Frequencies are computed with joins against the full dataset's provenance
values, so incremental (Daisy) and offline repairs coincide exactly — the
paper's "Daisy outputs the same results with the offline approach".
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.constraints import FD
from repro.core.prob import TID, cand_type, cands_col

#: world id of the rhs-varies (lhs kept) world, shared/merged across rules
RHS_WORLD = 1


def lhs_world(rule_index: int) -> int:
    """World id of rule ``rule_index``'s lhs-varies world."""
    return 2 + rule_index


def compute_repairs(
    dataset: DataFrame,
    rules: list[tuple[FD, int]],
    dirty_map: DataFrame,
) -> DataFrame:
    """Recompute candidate cells for the tuples listed in ``dirty_map``.

    ``rules``: list of ``(fd, world_id)`` — every rule the session knows.
    ``dirty_map``: frame ``(TID, rule_name)`` marking which tuples are to be
    repaired under which rules (a tuple may appear once per rule).

    Returns one row per dirty tid with columns ``TID`` and
    ``<attr>__cands`` for every attribute of any rule; a null cands value
    means "this repair does not touch that cell" (update keeps the old one).
    """
    dirty_map = dirty_map.select(TID, "rule_name").distinct().localCheckpoint(eager=True)
    all_tids = dirty_map.select(TID).distinct()

    # ---- world-1: merged rhs candidates per rhs attribute ----------------
    per_attr_cands: dict[str, DataFrame] = {}  # attr -> (TID, __arr)
    rhs_attrs = {fd.rhs for fd, _ in rules}
    for x in rhs_attrs:
        sup = None
        for fd, _w in rules:
            if fd.rhs != x:
                continue
            tside = (
                dataset.join(
                    F.broadcast(dirty_map.where(F.col("rule_name") == fd.name).select(TID)),
                    TID,
                    "leftsemi",
                )
                .select(TID, *[F.col(a).alias(f"__k{i}") for i, a in enumerate(fd.lhs)])
            )
            dside = dataset.select(
                F.col(TID).alias("__sup_tid"),
                F.col(x).alias("__sup_x"),
                *[F.col(a).alias(f"__k{i}") for i, a in enumerate(fd.lhs)],
            )
            s = F.broadcast(tside).join(
                dside, [f"__k{i}" for i in range(len(fd.lhs))]
            ).select(TID, "__sup_tid", "__sup_x")
            sup = s if sup is None else sup.unionByName(s)
        if sup is None:
            continue
        sup = sup.distinct()  # union of supporter groups (§4.3)
        counts = sup.groupBy(TID, "__sup_x").agg(F.count("*").alias("__c"))
        counts = counts.withColumn("__t", F.sum("__c").over(Window.partitionBy(TID)))
        arr = (
            counts
            .groupBy(TID)
            .agg(
                F.collect_list(
                    F.struct(
                        F.col("__sup_x").alias("v"),
                        (F.col("__c") / F.col("__t")).alias("p"),
                        F.lit(RHS_WORLD).alias("w"),
                    )
                ).alias("__arr")
            )
        )
        per_attr_cands[x] = arr

    # ---- keep-entries and per-rule lhs worlds ---------------------------
    # keep entries for the rhs cell (world w_r) and the lhs cell (world 1)
    keep_rhs: dict[str, DataFrame] = {}  # attr -> (TID, __keep_arr)
    lhs_cands: dict[str, DataFrame] = {}  # attr -> (TID, __arr)
    for fd, w_r in rules:
        marked = dataset.join(
            F.broadcast(dirty_map.where(F.col("rule_name") == fd.name).select(TID)),
            TID,
            "leftsemi",
        )
        # rhs keep entry in this rule's lhs-varies world
        k = marked.select(
            TID,
            F.array(
                F.struct(
                    F.col(fd.rhs).alias("v"), F.lit(1.0).alias("p"), F.lit(w_r).alias("w")
                )
            ).alias("__keep_arr"),
        )
        keep_rhs.setdefault(fd.rhs, None)
        keep_rhs[fd.rhs] = (
            k
            if keep_rhs[fd.rhs] is None
            else keep_rhs[fd.rhs]
            .unionByName(k)
            .groupBy(TID)
            .agg(F.flatten(F.collect_list("__keep_arr")).alias("__keep_arr"))
        )
        if not fd.single_lhs:
            continue
        la = fd.lhs[0]
        # lhs candidates: P(c_lhs | t.rhs) over provenance values
        tside = marked.select(TID, F.col(fd.rhs).alias("__kr"))
        dside = dataset.select(
            F.col(fd.rhs).alias("__kr"), F.col(la).alias("__sup_l")
        )
        counts = (
            F.broadcast(tside).join(dside, "__kr")
            .groupBy(TID, "__sup_l")
            .agg(F.count("*").alias("__c"))
        )
        counts = counts.withColumn("__t", F.sum("__c").over(Window.partitionBy(TID)))
        larr = (
            counts
            .groupBy(TID)
            .agg(
                F.collect_list(
                    F.struct(
                        F.col("__sup_l").alias("v"),
                        (F.col("__c") / F.col("__t")).alias("p"),
                        F.lit(w_r).alias("w"),
                    )
                ).alias("__larr"),
            )
        )
        # lhs keep entry in world 1
        lkeep = marked.select(
            TID,
            F.array(
                F.struct(F.col(la).alias("v"), F.lit(1.0).alias("p"), F.lit(RHS_WORLD).alias("w"))
            ).alias("__lkeep"),
        )
        piece = (
            lkeep.join(larr, TID, "left")
            .select(
                TID,
                F.concat(
                    F.col("__lkeep"), F.coalesce(F.col("__larr"), F.array())
                ).alias("__arr"),
            )
        )
        if la in lhs_cands:
            # same attr is the lhs of several rules: merge world arrays,
            # de-duplicating the world-1 keep entry
            merged = (
                lhs_cands[la]
                .unionByName(piece)
                .groupBy(TID)
                .agg(F.array_distinct(F.flatten(F.collect_list("__arr"))).alias("__arr"))
            )
            lhs_cands[la] = merged
        else:
            lhs_cands[la] = piece

    # ---- assemble one row per dirty tid ---------------------------------
    out = all_tids
    attrs = sorted({fd.rhs for fd, _ in rules} | {fd.lhs[0] for fd, _ in rules if fd.single_lhs})
    for a in attrs:
        pieces = []
        if a in per_attr_cands:
            pieces.append(per_attr_cands[a].withColumnRenamed("__arr", f"__p1_{a}"))
        if a in keep_rhs and keep_rhs[a] is not None:
            pieces.append(keep_rhs[a].withColumnRenamed("__keep_arr", f"__p2_{a}"))
        if a in lhs_cands:
            pieces.append(lhs_cands[a].withColumnRenamed("__arr", f"__p3_{a}"))
        if not pieces:
            continue
        acc = out
        for p in pieces:
            acc = acc.join(p, TID, "left")
        cols = [c for c in acc.columns if c.startswith("__p")]
        empty = F.array().cast(cand_type(dataset, a))
        nonnull = [F.coalesce(F.col(c), empty) for c in cols]
        merged = F.concat(*nonnull) if len(nonnull) > 1 else nonnull[0]
        # null (not empty) when no piece touched the cell
        any_nonnull = None
        for c in cols:
            cond = F.col(c).isNotNull()
            any_nonnull = cond if any_nonnull is None else (any_nonnull | cond)
        out = acc.select(
            *[c for c in acc.columns if not c.startswith("__p")],
            F.when(any_nonnull, merged).alias(cands_col(a)),
        )
    return out
