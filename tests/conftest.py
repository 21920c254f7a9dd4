"""Shared test fixtures: small-scale Labs and datasets.

Test scale factors are chosen so each dataset has enough trips for a
train/test split with at least a couple of injected gaps while keeping the
whole suite fast. ``Lab`` caches datasets, splits, gaps, and fitted models
session-wide, so model fits happen once per (dataset, resolution).
"""
import pytest

from repro.eval.tables import Lab

#: Test-scale factor per dataset (bench scale is 1.0).
TEST_SF = {"KIEL": 0.15, "DAN": 0.08, "SAR": 0.06}


class TestLab(Lab):
    """Lab whose scale factor varies per dataset (small everywhere)."""

    def raw(self, name):
        if name not in self._raw:
            from repro.ais.datasets import dataset

            self._raw[name] = dataset(name, TEST_SF[name])
        return self._raw[name]


@pytest.fixture(scope="session")
def lab(spark) -> Lab:
    """Session-wide experiment lab at test scale."""
    return TestLab(spark, sf=-1.0)  # sf unused: raw() overrides per dataset


@pytest.fixture(scope="session")
def kiel_trips(lab):
    """Preprocessed KIEL trips (pandas)."""
    return lab.trips_pdf("KIEL")


@pytest.fixture(scope="session")
def sar_trips(lab):
    """Preprocessed SAR trips (pandas)."""
    return lab.trips_pdf("SAR")
