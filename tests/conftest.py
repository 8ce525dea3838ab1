"""Shared fixtures: small (SF<=0.01) workload databases, both as pandas
(for the interpreter/oracle ground truth) and as Spark DataFrames.

All Spark tables are cached so the many capture/use tests don't re-ship
the pandas frames to the JVM each time.
"""
import pytest

from repro.workloads import crimes as WC
from repro.workloads import movies as WM
from repro.workloads import sof as WS
from repro.workloads import tpch as WT

TPCH_SF = 0.002
CRIMES_SF = 0.0005
MOVIES_SF = 0.0005
SOF_SF = 0.00005


def _sparkify(spark, pdb):
    out = {}
    for name, pdf in pdb.items():
        df = spark.createDataFrame(pdf)
        df.cache().count()
        out[name] = df
    return out


@pytest.fixture(scope="session")
def tpch_pdb():
    return WT.tables_pandas(sf=TPCH_SF)


@pytest.fixture(scope="session")
def tpch_db(spark, tpch_pdb):
    return _sparkify(spark, tpch_pdb)


@pytest.fixture(scope="session")
def crimes_pdb():
    return WC.tables_pandas(sf=CRIMES_SF)


@pytest.fixture(scope="session")
def crimes_db(spark, crimes_pdb):
    return _sparkify(spark, crimes_pdb)


@pytest.fixture(scope="session")
def movies_pdb():
    return WM.tables_pandas(sf=MOVIES_SF)


@pytest.fixture(scope="session")
def movies_db(spark, movies_pdb):
    return _sparkify(spark, movies_pdb)


@pytest.fixture(scope="session")
def sof_pdb():
    return WS.tables_pandas(sf=SOF_SF)


@pytest.fixture(scope="session")
def sof_db(spark, sof_pdb):
    return _sparkify(spark, sof_pdb)
