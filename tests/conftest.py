"""Shared fixtures: Wisconsin test data, the five backends, oracle helpers.

Test data is SF-tiny (2 000 records ≈ 1/1000 of the paper's XS dataset,
DESIGN.md §2 substitution 3) and deterministic, so the DuckDB oracle, the
pandas baseline and every PolyFrame backend all see identical rows.
"""
from __future__ import annotations

import duckdb
import pandas as pd
import pytest

from repro import oracle
from repro.bench.harness import (
    BACKENDS,
    COLLECTION,
    COLLECTION2,
    NAMESPACE,
    make_connector,
    register_dataset,
)
from repro.core import PolyFrame
from repro.wisconsin.generator import wisconsin_pdf

N_TEST = 2_000
SEED = 42


@pytest.fixture(scope="session")
def wdata() -> pd.DataFrame:
    return wisconsin_pdf(N_TEST, seed=SEED)


@pytest.fixture(scope="session")
def wdata2(wdata) -> pd.DataFrame:
    # "a join of two identical datasets" (paper expression 12)
    return wdata.copy()


@pytest.fixture(scope="session")
def backends(spark, wdata, wdata2) -> dict:
    """All five PolyFrame backends with the Wisconsin datasets registered."""
    conns = {}
    for kind in BACKENDS:
        conn = make_connector(kind, spark)
        register_dataset(conn, wdata, wdata2)
        conns[kind] = conn
    return conns


@pytest.fixture(params=BACKENDS)
def backend(request, backends):
    """Parametrize a test over every backend: yields (name, connector)."""
    return request.param, backends[request.param]


def polyframes(connector) -> tuple[PolyFrame, PolyFrame]:
    """The benchmark's two identical Wisconsin frames on one backend."""
    return (
        PolyFrame(NAMESPACE, COLLECTION, connector),
        PolyFrame(NAMESPACE, COLLECTION2, connector),
    )


def check_frame(spark, result: pd.DataFrame, sql: str, **tables) -> None:
    """Oracle-check a pandas result PolyFrame returned, lifting it into
    Spark so tests reuse repro.oracle.assert_equivalent verbatim."""
    assert len(result) > 0, "refusing to oracle-check an empty result"
    oracle.assert_equivalent(spark.createDataFrame(result), sql, **tables)


def duck_scalar(sql: str, **tables):
    """Evaluate a scalar oracle query directly in DuckDB."""
    con = duckdb.connect()
    try:
        for name, t in tables.items():
            con.register(name, t)
        return con.execute(sql).fetchone()[0]
    finally:
        con.close()
