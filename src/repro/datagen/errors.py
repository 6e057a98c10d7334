"""BART-like error injection with ground-truth provenance.

The paper (§7) injects errors "similar to BART [4] with the difference that
we also add errors using uniform distribution to evenly distribute the errors
across the dataset, thereby affecting all queries", and guarantees the
injected errors are *detectable* by the constraints under evaluation.

Two injectors:

- :func:`inject_fd_errors` — for an FD ``lhs → rhs``: pick a fraction of lhs
  groups, and inside each picked group edit a fraction of the rows' rhs to a
  value drawn from a *different* group's rhs domain (detectable: the group now
  has ≥2 distinct rhs values). Optionally also edit lhs cells (used by the
  hospital generator to create cross-rule evidence).
- :func:`inject_dc_errors` — for a two-tuple inequality DC over
  ``(x, y)`` (e.g. ``¬(t1.x < t2.x ∧ t1.y > t2.y)``): the clean table has
  ``y`` monotone in ``x``; edits replace ``y`` of a row with the ``y`` level
  of a far-away ``x`` percentile, creating outlier values that conflict with
  many tuples across matrix partitions (the paper's Fig 10 20% scenario).

Both return ``(dirty_pdf, truth_pdf)`` where ``truth_pdf`` has one row per
edited cell: ``(rid, attr, clean_value, dirty_value)``. ``rid`` indexes the
input frame's positional order and matches the ``__tid`` assigned by
:func:`repro.core.prob.with_tid` when the frame is sent to Spark unshuffled.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def inject_fd_errors(
    pdf: pd.DataFrame,
    lhs: tuple[str, ...],
    rhs: str,
    *,
    frac_groups: float = 1.0,
    frac_rows: float = 0.1,
    seed: int = 0,
    min_edits_per_group: int = 1,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Edit ``frac_rows`` of the rhs values inside ``frac_groups`` of lhs groups.

    Replacement values come from the global rhs domain minus the group's own
    value, drawn uniformly, so every edit creates a detectable violation and
    errors are spread evenly across groups (paper's worst-case setup edits
    10% of suppliers of *every* orderkey).
    """
    g = np.random.default_rng(seed)
    dirty = pdf.reset_index(drop=True).copy()
    lhs = tuple(lhs)
    key = dirty[list(lhs)].astype(str).agg("\x00".join, axis=1) if len(lhs) > 1 else dirty[lhs[0]]
    groups = key.groupby(key).groups  # value -> row positions
    domain = dirty[rhs].unique()
    if len(domain) < 2:
        raise ValueError("need >=2 distinct rhs values to inject detectable errors")
    picked = [k for k in groups if g.random() < frac_groups]
    records: list[tuple[int, str, object, object]] = []
    for k in picked:
        rows = np.asarray(groups[k])
        if len(rows) < 2:
            # a single-row group cannot produce a detectable FD violation
            continue
        n_edit = max(min_edits_per_group, int(round(frac_rows * len(rows))))
        n_edit = min(n_edit, len(rows))
        # Keep at least one row clean so the group has a clean majority signal
        # when the group is big enough (BART keeps violations repairable).
        if n_edit == len(rows) and len(rows) > 1:
            n_edit = len(rows) - 1
        edit_rows = g.choice(rows, size=n_edit, replace=False)
        for r in edit_rows:
            clean_v = dirty.at[r, rhs]
            wrong = domain[domain != clean_v]
            new_v = wrong[g.integers(0, len(wrong))]
            records.append((int(r), rhs, clean_v, new_v))
            dirty.at[r, rhs] = new_v
    truth = pd.DataFrame(records, columns=["rid", "attr", "clean_value", "dirty_value"])
    return dirty, truth


def inject_lhs_errors(
    pdf: pd.DataFrame,
    lhs_attr: str,
    *,
    frac_rows: float = 0.05,
    seed: int = 1,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Edit a fraction of rows' ``lhs_attr`` to another existing lhs value.

    Used to create errors on the lhs side of one rule that are the rhs side
    of another (hospital Table-5 scenario: zip errors are repairable through
    name→zip / phone→zip but poison zip→city majorities).
    """
    g = np.random.default_rng(seed)
    dirty = pdf.reset_index(drop=True).copy()
    domain = dirty[lhs_attr].unique()
    n_edit = max(1, int(round(frac_rows * len(dirty))))
    rows = g.choice(len(dirty), size=n_edit, replace=False)
    records = []
    for r in rows:
        clean_v = dirty.at[r, lhs_attr]
        wrong = domain[domain != clean_v]
        new_v = wrong[g.integers(0, len(wrong))]
        records.append((int(r), lhs_attr, clean_v, new_v))
        dirty.at[r, lhs_attr] = new_v
    truth = pd.DataFrame(records, columns=["rid", "attr", "clean_value", "dirty_value"])
    return dirty, truth


def monotone_discount(price: np.ndarray, *, levels: int = 11) -> np.ndarray:
    """A DC-clean discount column: a monotone step function of price.

    Guarantees ``¬(t1.price < t2.price ∧ t1.discount > t2.discount)`` holds
    (discount is non-decreasing in price).
    """
    order = price.argsort().argsort()  # rank
    return np.round((order * levels // max(1, len(price))) / 100.0, 2)


def inject_dc_errors(
    pdf: pd.DataFrame,
    x: str,
    y: str,
    *,
    frac_rows: float = 0.02,
    shift: float = 0.5,
    seed: int = 2,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Make ``frac_rows`` of tuples violate the monotone DC on ``(x, y)``.

    Each edited row's ``y`` is replaced by the clean ``y`` level of the row at
    x-percentile ``pct ± shift`` — an outlier value that conflicts with the
    tuples between the two percentiles, i.e. across many theta-join matrix
    partitions when ``shift`` is large (paper Fig 10: "dirty values are
    spread across different partitions and contain outlier values").
    """
    g = np.random.default_rng(seed)
    dirty = pdf.reset_index(drop=True).copy()
    n = len(dirty)
    xs = dirty[x].to_numpy()
    ys = dirty[y].to_numpy().copy()
    pct = xs.argsort().argsort() / max(1, n - 1)
    order = np.argsort(xs)
    n_edit = max(1, int(round(frac_rows * n)))
    rows = g.choice(n, size=n_edit, replace=False)
    records = []
    for r in rows:
        direction = 1 if pct[r] < 0.5 else -1
        target_pct = float(np.clip(pct[r] + direction * shift, 0.0, 1.0))
        donor = order[int(target_pct * (n - 1))]
        clean_v = dirty.at[r, y]
        new_v = ys[donor]
        if new_v == clean_v:  # degenerate level collision; nudge outside range
            new_v = clean_v + direction * 0.05
        records.append((int(r), y, clean_v, round(float(new_v), 4)))
        dirty.at[r, y] = round(float(new_v), 4)
    truth = pd.DataFrame(records, columns=["rid", "attr", "clean_value", "dirty_value"])
    return dirty, truth
