"""Table III / Figure 5 benchmark: the 13 expressions, XS dataset.

Expression-only runtimes for Pandas and PolyFrame on all five backends
(paper Fig. 5c/5d), plus the DataFrame-creation timing point (Fig. 5a/5b's
other component: pd.read_json vs PolyFrame's q1-only construction).
Regenerates with:
    pytest benchmarks/bench_table3_expressions.py --benchmark-only
"""
from __future__ import annotations

import pandas as pd
import pytest

from repro.bench.expressions import EXPRESSIONS
from repro.bench.harness import COLLECTION, NAMESPACE, make_connector
from repro.core import PolyFrame

IDS = [e.id for e in EXPRESSIONS]
NAMES = {e.id: e for e in EXPRESSIONS}
SYSTEMS = ("pandas", "sparksql", "sql", "sqlpp", "mongo", "cypher")


@pytest.mark.parametrize("expr_id", IDS)
@pytest.mark.parametrize("system", SYSTEMS)
def test_expression_runtime(benchmark, system, expr_id, xs_backends, xs_data):
    e = NAMES[expr_id]
    benchmark.group = f"table3-expr{expr_id:02d}-{e.name}"
    if system == "pandas":
        df = xs_data
        benchmark.pedantic(
            lambda: e.pandas_fn(df, df), rounds=3, iterations=1, warmup_rounds=1
        )
    else:
        conn = xs_backends[system]
        pf = PolyFrame(NAMESPACE, COLLECTION, conn)
        pf2 = PolyFrame(NAMESPACE, COLLECTION + "2", conn)
        benchmark.pedantic(
            lambda: e.poly_fn(pf, pf2), rounds=3, iterations=1, warmup_rounds=1
        )



@pytest.mark.benchmark(group="table3-creation")
def test_creation_pandas_read_json(benchmark, xs_json):
    """Pandas DataFrame creation: load the whole JSON file (Appendix D)."""
    out = benchmark.pedantic(
        lambda: pd.read_json(xs_json, orient="records", lines=True),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    assert len(out) == 5_000


@pytest.mark.parametrize("system", [s for s in SYSTEMS if s != "pandas"])
@pytest.mark.benchmark(group="table3-creation")
def test_creation_polyframe(benchmark, system, xs_backends):
    """PolyFrame creation: verify the dataset and form q1 — no data load."""
    conn = xs_backends[system]
    pf = benchmark.pedantic(
        lambda: PolyFrame(NAMESPACE, COLLECTION, conn),
        rounds=5,
        iterations=1,
        warmup_rounds=1,
    )
    assert pf.query
