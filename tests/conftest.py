"""Shared fixtures for the RMA reproduction tests."""
import pathlib
import sys

import pandas as pd
import pytest

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))

from helpers import make_rel  # noqa: E402


@pytest.fixture(scope="session")
def weather(spark):
    """Relation r of Figures 2/3: schema (T, H, W), key T."""
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "T": ["5am", "8am", "7am", "6am"],
                "H": [1.0, 8.0, 6.0, 1.0],
                "W": [3.0, 5.0, 7.0, 4.0],
            }
        )
    ).cache()


@pytest.fixture(scope="session")
def weather_sel(weather):
    """σ_{T>6am}(r) of Figure 3 — rows 7am and 8am."""
    return weather.filter("T > '6am'")


@pytest.fixture
def rel_factory(spark):
    def factory(n_rows, n_app, **kw):
        return make_rel(spark, n_rows, n_app, **kw)

    return factory
