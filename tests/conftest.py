"""Shared fixtures: one tiny generated dataset + its Spark tables."""
import pytest

from repro.data.datasets import load

TEST_SF = 0.02


@pytest.fixture(scope="session")
def ytube():
    """Tiny YTube-like dataset (pandas side)."""
    return load("ytube", TEST_SF)


@pytest.fixture(scope="session")
def ytube_spark(spark, ytube):
    """The same dataset lifted to Spark DataFrames (cached)."""
    dfs = ytube.to_spark(spark)
    for df in dfs.values():
        df.cache().count()
    return dfs
