"""Query-workload generators for the paper's experiments (§7).

The SP experiments run *non-overlapping* equality/range queries whose union
covers the whole dataset (Figs 5-9); the SPJ experiments filter lineorder
and join it with supplier (Figs 11-12); the real-world scenarios run
per-entity lookups (Nestle) and per-county group-by aggregates (air
quality).  All generators are deterministic.
"""
from __future__ import annotations

import numpy as np

from repro.core.planner import Aggregate, Filter, JoinSpec, Query


def range_partition(lo: int, hi: int, n_queries: int) -> list[tuple[int, int]]:
    """Split the inclusive integer domain [lo, hi] into n contiguous ranges."""
    edges = np.linspace(lo, hi + 1, n_queries + 1).astype(int)
    out = []
    for i in range(n_queries):
        a, b = int(edges[i]), int(edges[i + 1]) - 1
        if b >= a:
            out.append((a, b))
    return out


def sp_range_queries(
    attr: str, lo: int, hi: int, n_queries: int, *, table: str = "lineorder"
) -> list[Query]:
    """Non-overlapping range filters covering the whole [lo, hi] domain."""
    return [
        Query(table, [Filter(attr, "between", a, b)])
        for a, b in range_partition(lo, hi, n_queries)
    ]


def mixed_random_queries(
    attr: str,
    lo: int,
    hi: int,
    n_queries: int,
    *,
    table: str = "lineorder",
    seed: int = 0,
    equality_frac: float = 0.3,
) -> list[Query]:
    """Fig 7/12 style: non-overlapping, equality + range, random selectivity.

    The domain is cut at random points; small cuts become equality filters.
    """
    g = np.random.default_rng(seed)
    cuts = np.sort(g.choice(np.arange(lo + 1, hi), size=n_queries - 1, replace=False))
    edges = [lo, *[int(c) for c in cuts], hi + 1]
    qs = []
    for i in range(n_queries):
        a, b = edges[i], edges[i + 1] - 1
        if b < a:
            continue
        if b == a or g.random() < equality_frac:
            qs.append(Query(table, [Filter(attr, "=", a)]))
        else:
            qs.append(Query(table, [Filter(attr, "between", a, b)]))
    return qs


def join_queries(
    attr: str,
    lo: int,
    hi: int,
    n_queries: int,
    *,
    left_table: str = "lineorder",
    right_table: str = "supplier",
    on: str = "suppkey",
) -> list[Query]:
    """Fig 11: filter lineorder, join with supplier on suppkey."""
    return [
        Query(
            left_table,
            [Filter(attr, "between", a, b)],
            join=JoinSpec(right_table, on, on),
        )
        for a, b in range_partition(lo, hi, n_queries)
    ]


def nestle_queries(categories: list[str], *, table: str = "nestle") -> list[Query]:
    """§7.3: one SP lookup per coffee-product category (37 queries)."""
    return [Query(table, [Filter("category", "=", c)]) for c in categories]


def airquality_queries(counties: list[str], *, table: str = "air") -> list[Query]:
    """§7.3: avg CO per county grouped by year (52 queries)."""
    return [
        Query(
            table,
            [Filter("county_name", "=", c)],
            group_by=["year"],
            aggs=[Aggregate("avg", "sample_measurement", "avg_co")],
        )
        for c in counties
    ]
