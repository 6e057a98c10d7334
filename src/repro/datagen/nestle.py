"""Nestle-like food/drink product dataset (paper §7.3, Table 8).

The real dataset is proprietary: ~19 attributes per product, a dirty
``Material → Category`` FD (material = e.g. type of beans, category = type of
product), 95% conflicting entities, and a *low-selectivity* ``Category``
attribute — each category co-occurs with many erroneous materials, which is
what makes the offline cleaner iterate over the dataset per erroneous group
(paper: 8.5 h on the 200 MB version vs 26.8 min for Daisy).

This generator reproduces those structural properties: few categories, many
materials, nearly every material group conflicting after injection.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.datagen.errors import inject_fd_errors


def nestle_pdf(
    *,
    n_rows: int = 20_000,
    n_materials: int = 800,
    n_categories: int = 24,
    frac_conflicting_groups: float = 0.95,
    seed: int = 17,
) -> tuple[pd.DataFrame, pd.DataFrame, pd.DataFrame]:
    """Products with ``material → category`` true, then ~95% groups violated.

    Returns ``(dirty, clean, truth)`` like the other generators.
    """
    g = np.random.default_rng(seed)
    mat_cat = g.integers(0, n_categories, n_materials)
    material = g.integers(0, n_materials, n_rows)
    clean = pd.DataFrame(
        {
            "product_id": np.arange(n_rows),
            "product_name": np.array([f"product_{i % 5000}" for i in range(n_rows)]),
            "brand": np.array([f"brand_{i % 120}" for i in range(n_rows)]),
            "material": np.array([f"mat_{m}" for m in material]),
            "category": np.array([f"cat_{c}" for c in mat_cat[material]]),
            "sub_brand": np.array([f"sub_{i % 400}" for i in range(n_rows)]),
            "flavour": np.array([f"flav_{i % 60}" for i in range(n_rows)]),
            "market": np.array([f"mkt_{i % 30}" for i in range(n_rows)]),
            "weight_g": g.integers(10, 2000, n_rows).astype("int64"),
            "price": (g.random(n_rows) * 20 + 0.5).round(2),
        }
    )
    dirty, truth = inject_fd_errors(
        clean,
        ("material",),
        "category",
        frac_groups=frac_conflicting_groups,
        frac_rows=0.1,
        seed=seed + 1,
    )
    return dirty, clean, truth
