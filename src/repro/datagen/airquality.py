"""Air-quality-like dataset (paper §7.3, Table 8).

The paper uses Kaggle's EPA historical air quality hourly measurements
(~2 GB) with errors injected into the composite FD
``county_code, state_code → county_name`` on *non-frequent* lhs pairs.
Error rates of 0.001% / 0.003% of cells produce 30% / 97% *violating rows*
because one erroneous cell poisons its whole (large) group.

This generator reproduces the mechanism directly: a ``target_violating_frac``
knob picks groups (smallest first — "non-frequent pairs") and injects one
error per picked group until the picked groups cover the requested fraction
of rows.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def airquality_pdf(
    *,
    n_rows: int = 120_000,
    n_counties: int = 400,
    n_states: int = 50,
    years: tuple[int, int] = (2000, 2017),
    target_violating_frac: float = 0.30,
    seed: int = 23,
) -> tuple[pd.DataFrame, pd.DataFrame, pd.DataFrame]:
    """Hourly CO measurements; returns ``(dirty, clean, truth)``.

    County popularity is zipfian so there are frequent and non-frequent
    (state_code, county_code) pairs, as in the real data.
    """
    g = np.random.default_rng(seed)
    ranks = np.arange(1, n_counties + 1)
    w = 1.0 / ranks**1.1
    w /= w.sum()
    county = g.choice(n_counties, size=n_rows, p=w)
    county_state = g.integers(0, n_states, n_counties)
    # per-state running index → (state_code, county_code) uniquely names a
    # county while county_code alone collides across states (composite lhs)
    county_code = np.zeros(n_counties, dtype="int64")
    for s in range(n_states):
        idx = np.where(county_state == s)[0]
        county_code[idx] = np.arange(len(idx))
    clean = pd.DataFrame(
        {
            "row_id": np.arange(n_rows),
            "state_code": county_state[county],
            "county_code": county_code[county],
            "county_name": np.array([f"county_{c}" for c in county]),
            "site_num": g.integers(1, 20, n_rows).astype("int64"),
            "parameter_name": "Carbon monoxide",
            "year": g.integers(years[0], years[1] + 1, n_rows).astype("int64"),
            "sample_measurement": (g.random(n_rows) * 3.0).round(3),
            "units": "Parts per million",
            "mdl": 0.5,
        }
    )
    # NOTE: (state_code, county_code) jointly identify the county (county_code
    # alone collides across states via the %120 fold), making the lhs
    # genuinely composite like the paper's rule.
    key = clean["state_code"].astype(str) + "\x00" + clean["county_code"].astype(str)
    sizes = key.value_counts()  # descending
    # pick non-frequent groups first until their rows cover the target frac
    picked, covered = [], 0
    for k, sz in sizes.iloc[::-1].items():
        if covered / n_rows >= target_violating_frac:
            break
        picked.append(k)
        covered += int(sz)
    dirty = clean.copy()
    name_domain = clean["county_name"].unique()
    records = []
    groups = key.groupby(key).groups
    for k in picked:
        rows = np.asarray(groups[k])
        if len(rows) < 2:
            continue
        r = int(rows[g.integers(0, len(rows))])
        clean_v = dirty.at[r, "county_name"]
        wrong = name_domain[name_domain != clean_v]
        new_v = wrong[g.integers(0, len(wrong))]
        records.append((r, "county_name", clean_v, new_v))
        dirty.at[r, "county_name"] = new_v
    truth = pd.DataFrame(records, columns=["rid", "attr", "clean_value", "dirty_value"])
    return dirty, clean, truth
