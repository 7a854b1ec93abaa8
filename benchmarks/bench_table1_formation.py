"""Table I benchmark: incremental query *formation* cost per language.

The paper's Table I is the mechanism table — six dataframe operations and
the query each rewrite ruleset forms. This microbenchmark times the pure
formation path (no execution): transformations must stay negligible next
to query execution, otherwise PolyFrame's lazy design would tax every
operation. Regenerates with:
    pytest benchmarks/bench_table1_formation.py --benchmark-only
"""
from __future__ import annotations

import pytest

from repro.bench.recording import RecordingConnector
from repro.core import PolyFrame

LANGUAGES = ("sparksql", "sql", "sqlpp", "mongo", "cypher")


def table1_chain(lang: str) -> str:
    conn = RecordingConnector(lang)
    af = PolyFrame("Test", "Users", conn)
    af[af["lang"] == "en"][["name", "address"]].head(10)
    return conn.last_query


@pytest.mark.parametrize("lang", LANGUAGES)
@pytest.mark.benchmark(group="table1-formation")
def test_formation_six_ops(benchmark, lang):
    out = benchmark(table1_chain, lang)
    assert "name" in out
