"""Benchmark fixtures: scaled Wisconsin datasets + registered backends.

Benchmark scale is 1/100 of the paper's Table IV (XS = 5 000 records …
XL = 50 000 records, DESIGN.md §2 substitution 3). Everything is built
once per session; pytest-benchmark measures only the expression paths.
"""
from __future__ import annotations

from pathlib import Path

import pytest

from repro.bench.harness import BACKENDS, make_connector, register_dataset
from repro.wisconsin.generator import scaled_sizes, wisconsin_pdf

SCALE = 0.01
SIZES = scaled_sizes(SCALE)  # XS=5000 ... XL=50000
SEED = 42


@pytest.fixture(scope="session")
def datasets():
    """name -> pandas Wisconsin frame at the scaled Table IV sizes."""
    return {name: wisconsin_pdf(n, seed=SEED) for name, n in SIZES.items()}


@pytest.fixture(scope="session")
def xs_data(datasets):
    return datasets["XS"]


@pytest.fixture(scope="session")
def xs_json(tmp_path_factory, xs_data) -> Path:
    """The XS dataset as a JSON-lines file — pandas' creation-time input
    (the paper reads JSON files, Appendix D)."""
    path = tmp_path_factory.mktemp("bench_data") / "wisconsin_xs.json"
    xs_data.to_json(path, orient="records", lines=True)
    return path


@pytest.fixture(scope="session")
def xs_backends(spark, xs_data):
    """All five backends with the XS dataset registered (dataset twice,
    for the self-join expression)."""
    conns = {}
    for kind in BACKENDS:
        conn = make_connector(kind, spark)
        register_dataset(conn, xs_data, xs_data)
        conns[kind] = conn
    return conns
