"""Benchmark fixtures: bench-scale datasets (TPC-H SF~=0.1, i.e.
~600k lineitem rows; real-world workloads scaled likewise), written
once per session as clustered Parquet + cached in memory."""
import pytest

from repro.experiments.common import (
    crimes_dataset,
    movies_dataset,
    sof_dataset,
    tpch_dataset,
)


@pytest.fixture(scope="session")
def tpch_ds(spark, tmp_path_factory):
    ds = tpch_dataset(spark, str(tmp_path_factory.mktemp("bench_tpch")))
    yield ds
    ds.unpersist()


@pytest.fixture(scope="session")
def crimes_ds(spark, tmp_path_factory):
    ds = crimes_dataset(spark, str(tmp_path_factory.mktemp("bench_crimes")))
    yield ds
    ds.unpersist()


@pytest.fixture(scope="session")
def movies_ds(spark, tmp_path_factory):
    ds = movies_dataset(spark, str(tmp_path_factory.mktemp("bench_movies")))
    yield ds
    ds.unpersist()


@pytest.fixture(scope="session")
def sof_ds(spark, tmp_path_factory):
    ds = sof_dataset(spark, str(tmp_path_factory.mktemp("bench_sof")))
    yield ds
    ds.unpersist()
