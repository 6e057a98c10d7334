"""Query-result relaxation (paper §4.1, Algorithm 1).

Given a query answer ``A`` over dataset ``d`` and an FD ``lhs → rhs``,
relaxation augments ``A`` with *correlated tuples*: tuples of ``d - A``
sharing an lhs value (line 6) or an rhs value (line 8) with the current
result, iterating.

Iteration budget: Lemma 1 — one iteration gives accurate candidate fixes for
rhs-side filters; Lemma 2 — lhs-side filters need one extra iteration; the
fixpoint ("closure") pulls whole correlated clusters as in Examples 2-3 /
Tables 2b-3.  :class:`repro.core.daisy.DaisySession` uses the lemma budgets
(that is what the §5.2 cost model prices); tests use closure to reproduce
the paper's worked examples exactly.

Matching is probabilistic-aware: a tuple matches a value set through *any*
of its candidate values (§4 qualification semantics).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.constraints import FD
from repro.core.prob import TID, possible_values

#: iteration budgets per filtered side (Lemmas 1 and 2)
LEMMA_ITERS = {"rhs": 1, "lhs": 2, None: 2}


def _match_single(unvisited: DataFrame, attr: str, vals: DataFrame) -> DataFrame:
    """Rows of ``unvisited`` with any candidate value of ``attr`` in ``vals``."""
    ex = unvisited.select(
        F.col(TID).alias("__mtid"), F.explode(possible_values(unvisited, attr)).alias("v")
    )
    tids = (
        ex.join(F.broadcast(vals), "v", "leftsemi")
        .select(F.col("__mtid").alias(TID))
        .distinct()
    )
    return unvisited.join(F.broadcast(tids), TID, "leftsemi")


def _match_composite(unvisited: DataFrame, attrs: tuple[str, ...], vals: DataFrame) -> DataFrame:
    """Composite-lhs match on base (provenance) values."""
    return unvisited.join(vals, list(attrs), "leftsemi")


def _values(df: DataFrame, attrs: tuple[str, ...]) -> DataFrame:
    if len(attrs) == 1:
        a = attrs[0]
        return (
            df.select(F.explode(possible_values(df, a)).alias("v"))
            .where(F.col("v").isNotNull())
            .distinct()
        )
    return df.select(*attrs).distinct()


def relax_fd(
    dataset: DataFrame,
    answer: DataFrame,
    fd: FD,
    *,
    max_iter: int | None = None,
    filter_side: str | None = None,
) -> tuple[DataFrame, int]:
    """Run Algorithm 1; returns ``(total_extra, iterations_used)``.

    ``max_iter=None`` selects the Lemma budget for ``filter_side`` ('lhs',
    'rhs' or None); ``max_iter=0`` means run to fixpoint (closure).
    """
    if max_iter is None:
        max_iter = LEMMA_ITERS.get(filter_side, 2)
    closure = max_iter == 0
    budget = 10**6 if closure else max_iter

    lhs = fd.lhs
    current = answer
    unvisited = dataset.join(answer.select(TID), TID, "left_anti")
    if budget > 1:
        # reused across rounds; a single-round budget inlines it instead
        unvisited = unvisited.localCheckpoint(eager=True)
    extras: list[DataFrame] = []
    iters = 0
    for it in range(budget):
        iters += 1
        # A_lhs / A_rhs snapshots from the current (relaxed) result
        lhs_vals = _values(current, lhs)
        rhs_vals = _values(current, (fd.rhs,))
        if len(lhs) == 1:
            extra1 = _match_single(unvisited, lhs[0], lhs_vals)
        else:
            extra1 = _match_composite(unvisited, lhs, lhs_vals)
        rest = unvisited.join(extra1.select(TID), TID, "left_anti")
        extra2 = _match_single(rest, fd.rhs, rhs_vals)
        # Eager checkpoints every round: each iteration's plan otherwise
        # nests all previous rounds' anti-joins and re-executes them per
        # downstream action (measured: unbounded slowdown even on toy data).
        extra = extra1.unionByName(extra2).localCheckpoint(eager=True)
        if closure and extra.limit(1).count() == 0:
            iters -= 1  # the empty round is termination detection, not work
            break
        extras.append(extra)
        if not closure and it == budget - 1:
            break  # last budgeted round: current/unvisited no longer needed
        unvisited = rest.join(extra2.select(TID), TID, "left_anti").localCheckpoint(eager=True)
        current = current.unionByName(extra).localCheckpoint(eager=True)
    if not extras:
        return dataset.limit(0), iters
    total_extra = extras[0]
    for e in extras[1:]:
        total_extra = total_extra.unionByName(e)
    # extras are disjoint by construction (each drawn from a shrinking
    # unvisited pool), so no distinct() is needed
    return total_extra, iters
