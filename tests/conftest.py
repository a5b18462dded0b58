"""Shared fixtures for matcher tests: one small mixed-type table and the
standard fabricated pairs derived from it."""
import numpy as np
import pandas as pd
import pytest

from repro.fabrication.scenarios import (
    make_joinable,
    make_semantically_joinable,
    make_unionable,
    make_view_unionable,
)
from repro.table import Table


@pytest.fixture(scope="session")
def clients_table(spark):
    g = np.random.default_rng(7)
    n = 180
    pdf = pd.DataFrame({
        "client_id": np.arange(n),
        "client_name": [f"person {i}" for i in range(n)],
        "city": g.choice(["delft", "lyon", "athens", "milan", "ghent"], n),
        "country": g.choice(["netherlands", "france", "greece", "italy",
                             "belgium"], n),
        "phone": [f"{a:03d}-{b:04d}" for a, b in
                  zip(g.integers(200, 999, n), g.integers(0, 9999, n))],
        "income": g.normal(50_000, 9_000, n).round(2),
        "age": g.integers(18, 90, n),
    })
    return Table("clients", spark.createDataFrame(pdf))


@pytest.fixture(scope="session")
def unionable_verbatim(clients_table):
    return make_unionable(clients_table, row_overlap=0.6, schema_noise=False,
                          instance_noise=False, seed=11)


@pytest.fixture(scope="session")
def unionable_noisy(clients_table):
    return make_unionable(clients_table, row_overlap=0.6, schema_noise=True,
                          instance_noise=True, seed=12)


@pytest.fixture(scope="session")
def view_unionable_pair(clients_table):
    return make_view_unionable(clients_table, column_overlap=0.5,
                               schema_noise=False, seed=13)


@pytest.fixture(scope="session")
def joinable_pair(clients_table):
    return make_joinable(clients_table, column_overlap=0.5,
                         schema_noise=False, seed=14)


@pytest.fixture(scope="session")
def sem_joinable_pair(clients_table):
    return make_semantically_joinable(clients_table, column_overlap=0.5,
                                      schema_noise=False, seed=15)


def assert_valid_output(result, source, target, *, full_cross=False):
    """Common output-contract assertions for any matcher result."""
    assert list(result.columns) == ["source_col", "target_col", "score"]
    assert set(result["source_col"]) <= set(source.columns)
    assert set(result["target_col"]) <= set(target.columns)
    assert (result["score"].diff().dropna() <= 1e-12).all()  # sorted desc
    assert not result.duplicated(["source_col", "target_col"]).any()
    if full_cross:
        assert len(result) == len(source.columns) * len(target.columns)
