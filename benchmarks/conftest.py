"""Benchmark fixtures: build the two benchmark datasets (WILDS-lite,
ImageNet-lite) and their CHI indexes once per session under
``<repo>/data/`` (idempotent across sessions)."""
import pytest

from repro import harness


@pytest.fixture(scope="session")
def wilds_engine(spark):
    return harness.get_engine(spark, "wilds_lite")


@pytest.fixture(scope="session")
def wilds_baseline(spark):
    return harness.get_baseline(spark, "wilds_lite")


@pytest.fixture(scope="session")
def imagenet_engine(spark):
    return harness.get_engine(spark, "imagenet_lite")


@pytest.fixture(scope="session")
def imagenet_baseline(spark):
    return harness.get_baseline(spark, "imagenet_lite")
