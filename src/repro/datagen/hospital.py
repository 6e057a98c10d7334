"""Hospital-like dataset with ground truth (paper §7, Tables 5-7).

The paper's hospital dataset has 19 attributes, ~5% erroneous cells, a clean
master version, and is evaluated under three rules::

    φ1: zip → city            (¬(t1.zip=t2.zip ∧ t1.city≠t2.city))
    φ2: hospital_name → zip
    φ3: phone → zip

Structure encoded by this generator (drives the Table-5 accuracy *shape*):

- each hospital (name, phone) has one true (zip, city, county, state) and
  appears in ``rows_per_hospital`` measure rows, so name/phone groups are
  medium-sized with strong majorities;
- every city has exactly ``zips_per_city`` zips and every zip hosts
  ``hospitals_per_zip`` hospitals, so with φ1 *alone* the lhs-side evidence
  ``P(zip | city)`` is split ~evenly between sibling zips — majority voting
  on zip repairs is a coin flip (paper: DaisyP precision 0.41 / recall 0.51);
- ``share_county_frac`` of sibling-zip pairs share a county, capping what
  context-feature inference (HolocleanSim) can recover with one rule
  (paper: Holoclean recall 0.55 at φ1);
- injected errors are mostly *zip* edits (repairable through φ2/φ3 evidence,
  poisonous to φ1 majorities) plus a few *city* edits (repairable by φ1).

Returns ``(dirty_pdf, clean_pdf, truth_pdf)``; ``truth_pdf`` lists every
edited cell ``(rid, attr, clean_value, dirty_value)``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.datagen.errors import inject_fd_errors, inject_lhs_errors

ATTRS_19 = [
    "provider_id", "name", "address", "city", "state", "zip", "county",
    "phone", "type", "owner", "emergency", "condition", "measure_code",
    "measure_name", "score", "sample", "stateavg", "comparison", "date",
]


def hospital_pdf(
    *,
    n_hospitals: int = 168,
    rows_per_hospital: int = 6,
    zips_per_city: int = 2,
    hospitals_per_zip: int = 2,
    share_county_frac: float = 0.5,
    zip_err_frac: float = 0.04,
    city_err_frac: float = 0.02,
    seed: int = 42,
) -> tuple[pd.DataFrame, pd.DataFrame, pd.DataFrame]:
    """Build clean hospital rows, then inject zip and city errors."""
    g = np.random.default_rng(seed)
    n_zips = max(1, n_hospitals // hospitals_per_zip)
    n_cities = max(1, n_zips // zips_per_city)

    # city -> its zips; zip -> county (sibling zips share a county for a
    # fraction of cities, tie-ing context-based inference).
    zip_city = np.repeat(np.arange(n_cities), zips_per_city)[:n_zips]
    zip_county = np.empty(n_zips, dtype="int64")
    for c in range(n_cities):
        zs = np.where(zip_city == c)[0]
        if g.random() < share_county_frac:
            zip_county[zs] = c * 2
        else:
            zip_county[zs] = c * 2 + np.arange(len(zs)) % 2
    hosp_zip = np.arange(n_hospitals) % n_zips

    rows = []
    for h in range(n_hospitals):
        z = hosp_zip[h]
        for m in range(rows_per_hospital):
            rows.append(
                {
                    "provider_id": f"P{h:05d}",
                    "name": f"hospital_{h}",
                    "address": f"{100 + h} main st",
                    "city": f"city_{zip_city[z]}",
                    "state": f"ST{zip_city[z] % 10}",
                    "zip": f"z{z:05d}",
                    "county": f"county_{zip_county[z]}",
                    "phone": f"555-{h:06d}",
                    "type": "acute care",
                    "owner": ["government", "proprietary", "voluntary"][h % 3],
                    "emergency": "yes" if h % 2 else "no",
                    "condition": f"cond_{m % 4}",
                    "measure_code": f"MC-{m}",
                    "measure_name": f"measure_{m}",
                    "score": int(g.integers(0, 101)),
                    "sample": int(g.integers(10, 500)),
                    "stateavg": f"ST{zip_city[z] % 10}_MC-{m}",
                    "comparison": ["above", "below", "same"][m % 3],
                    "date": "2020-01-01",
                }
            )
    clean = pd.DataFrame(rows, columns=ATTRS_19)

    # zip errors: move rows to another existing zip (detectable by all three
    # rules: breaks zip→city in the target group and name/phone→zip at home).
    dirty, truth_zip = inject_lhs_errors(clean, "zip", frac_rows=zip_err_frac, seed=seed + 1)
    # city errors: classic rhs edits inside zip groups, detectable by φ1.
    dirty, truth_city = inject_fd_errors(
        dirty, ("zip",), "city", frac_groups=city_err_frac * 10, frac_rows=0.15, seed=seed + 2
    )
    truth = pd.concat([truth_zip, truth_city], ignore_index=True)
    return dirty, clean, truth
