"""Shared fixtures for the Daisy reproduction tests.

Keeps the session SparkSession small for tiny test frames: 8 shuffle
partitions (the root conftest reads ``SPARK_SHUFFLE_PARTITIONS`` when it
builds the session; this module is imported before the fixture runs).
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

import pandas as pd
import pytest

from repro.core import prob
from repro.core.constraints import FD


@pytest.fixture(scope="session")
def cities_pdf() -> pd.DataFrame:
    """The paper's Table 2a running example (zip → city)."""
    return pd.DataFrame(
        {
            "zip": ["9001", "9001", "9001", "10001", "10001"],
            "city": [
                "Los Angeles",
                "San Francisco",
                "Los Angeles",
                "San Francisco",
                "New York",
            ],
        }
    )


@pytest.fixture(scope="session")
def phi1() -> FD:
    return FD(("zip",), "city", name="phi1")


@pytest.fixture()
def cities(spark, cities_pdf, phi1):
    """Table 2a as a fresh probabilistic Spark frame (checked cols included)."""
    d = prob.spark_with_tid(spark, cities_pdf)
    d = prob.ensure_cands(d, ["zip", "city"])
    return prob.ensure_checked(d, [phi1.name]).localCheckpoint(eager=True)


@pytest.fixture(scope="session")
def ssb_small():
    """A small dirty SSB lineorder + its truth, shared across modules."""
    from repro.datagen import ssb
    from repro.datagen.errors import inject_fd_errors

    clean = ssb.lineorder_pdf(n_rows=2000, n_orderkeys=200, n_suppkeys=20, seed=3)
    dirty, truth = inject_fd_errors(
        clean, ("orderkey",), "suppkey", frac_groups=1.0, frac_rows=0.1, seed=4
    )
    return clean, dirty, truth
