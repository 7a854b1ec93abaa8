"""Paper Appendices E–H: the 13 translated benchmark queries per language.

The SQL++ column (Appendix E — the paper's original dialect) is frozen
verbatim; deviations from the printed appendix are the systematic ones
documented in tests/test_table1_formation.py (aggregate aliases like
``max_unique1``, parenthesized conjunctions, fully-nested q1 even where
the paper abbreviates, join via subqueries rather than bare dataset
names). The other languages are checked structurally — their exact
result *semantics* are covered by tests/test_expressions_correctness.py
on live engines.
"""
from __future__ import annotations

import json

import pytest

from repro.bench.expressions import EXPRESSIONS
from repro.bench.recording import RecordingConnector
from repro.core import PolyFrame

ALL_LANGS = ("sqlpp", "sql", "mongo", "cypher", "sparksql")


def generated(lang: str, expr_id: int) -> str:
    conn = RecordingConnector(lang)
    pf = PolyFrame("Bench", "wisconsin", conn)
    pf2 = PolyFrame("Bench", "wisconsin2", conn)
    e = next(e for e in EXPRESSIONS if e.id == expr_id)
    e.poly_fn(pf, pf2)
    return conn.last_query


BASE = "SELECT VALUE t FROM Bench.wisconsin t"
BASE2 = "SELECT VALUE t FROM Bench.wisconsin2 t"

EXPECTED_SQLPP = {
    1: f"SELECT VALUE COUNT(*) FROM ({BASE}) t",
    2: f"SELECT t.two, t.four FROM ({BASE}) t\nLIMIT 5",
    3: f"SELECT VALUE COUNT(*) FROM (SELECT VALUE t FROM ({BASE}) t "
    "WHERE ((t.ten = 7 AND t.twentyPercent = 2) AND t.two = 1)) t",
    4: "SELECT t.oddOnePercent, COUNT(t.oddOnePercent) AS count_oddOnePercent "
    f"FROM ({BASE}) t GROUP BY t.oddOnePercent",
    5: f"SELECT VALUE UPPER(t.stringu1) FROM (SELECT t.stringu1 FROM ({BASE}) t) t"
    "\nLIMIT 5",
    6: f"SELECT MAX(t.unique1) AS max_unique1 FROM (SELECT t.unique1 FROM ({BASE}) t) t",
    7: f"SELECT MIN(t.unique1) AS min_unique1 FROM (SELECT t.unique1 FROM ({BASE}) t) t",
    8: f"SELECT t.twenty, MAX(t.four) AS max_four FROM ({BASE}) t GROUP BY t.twenty",
    9: f"SELECT VALUE t FROM ({BASE}) t ORDER BY t.unique1 DESC\nLIMIT 5",
    10: f"SELECT VALUE t FROM ({BASE}) t WHERE t.ten = 7\nLIMIT 5",
    11: f"SELECT VALUE COUNT(*) FROM (SELECT VALUE t FROM ({BASE}) t "
    "WHERE (t.onePercent >= 10 AND t.onePercent <= 30)) t",
    12: f"SELECT VALUE COUNT(*) FROM (SELECT l, r FROM ({BASE}) l JOIN ({BASE2}) r "
    "ON l.unique1 = r.unique1) t",
    13: f"SELECT VALUE COUNT(*) FROM (SELECT VALUE t FROM ({BASE}) t "
    "WHERE t.tenPercent IS UNKNOWN) t",
}


@pytest.mark.parametrize("expr_id", sorted(EXPECTED_SQLPP))
def test_appendix_e_sqlpp(expr_id):
    assert generated("sqlpp", expr_id) == EXPECTED_SQLPP[expr_id]


# ---------------------------------------------------------------------------
# Appendix F (SQL / PostgreSQL dialect): structural checks
# ---------------------------------------------------------------------------
@pytest.mark.parametrize(
    "expr_id,fragments",
    [
        (1, ["SELECT COUNT(*) FROM", "FROM Bench.wisconsin"]),
        (2, ['t."two", t."four"', "LIMIT 5"]),
        (3, ['"ten" = 7', '"twentyPercent" = 2', '"two" = 1', "COUNT(*)"]),
        (4, ['GROUP BY t."oddOnePercent"', 'AS "count_oddOnePercent"']),
        (5, ['UPPER(t."stringu1")', "LIMIT 5"]),
        (6, ['MAX(t."unique1")']),
        (7, ['MIN(t."unique1")']),
        (8, ['GROUP BY t."twenty"', 'MAX(t."four") AS "max_four"']),
        (9, ['ORDER BY t."unique1" DESC', "LIMIT 5"]),
        (10, ['WHERE t."ten" = 7', "LIMIT 5"]),
        (11, ['"onePercent" >= 10', '"onePercent" <= 30', "COUNT(*)"]),
        (12, ["INNER JOIN", 'l."unique1" = r."unique1"', "SELECT l.*, r.*"]),
        (13, ['"tenPercent" IS NULL', "COUNT(*)"]),
    ],
)
def test_appendix_f_sql(expr_id, fragments):
    q = generated("sql", expr_id)
    for frag in fragments:
        assert frag in q, f"expected {frag!r} in SQL for expression {expr_id}:\n{q}"


# ---------------------------------------------------------------------------
# Appendix H (MongoDB pipelines): parsed-JSON shape checks
# ---------------------------------------------------------------------------
def mongo_pipeline(expr_id: int) -> list[dict]:
    return json.loads("[" + generated("mongo", expr_id) + "]")


def stage_names(pipeline: list[dict]) -> list[str]:
    return [next(iter(s)) for s in pipeline]


@pytest.mark.parametrize(
    "expr_id,names",
    [
        (1, ["$match", "$count"]),
        (2, ["$match", "$project", "$project", "$limit"]),
        (3, ["$match", "$match", "$count"]),
        (4, ["$match", "$group", "$addFields", "$project"]),
        (5, ["$match", "$project", "$project", "$project", "$limit"]),
        (6, ["$match", "$project", "$group", "$project"]),
        (7, ["$match", "$project", "$group", "$project"]),
        (8, ["$match", "$group", "$addFields", "$project"]),
        (9, ["$match", "$sort", "$project", "$limit"]),
        (10, ["$match", "$match", "$project", "$limit"]),
        (11, ["$match", "$match", "$count"]),
        (12, ["$match", "$lookup", "$unwind", "$count"]),
        (13, ["$match", "$match", "$count"]),
    ],
)
def test_appendix_h_stage_sequences(expr_id, names):
    assert stage_names(mongo_pipeline(expr_id)) == names


def test_appendix_h_expr9_sort_is_descending():
    assert mongo_pipeline(9)[1] == {"$sort": {"unique1": -1}}


def test_appendix_h_expr13_missing_via_lt_null():
    # the paper's idiom: {"$lt": ["$tenPercent", null]}
    assert mongo_pipeline(13)[1] == {
        "$match": {"$expr": {"$lt": ["$tenPercent", None]}}
    }


def test_appendix_h_expr12_lookup_shape():
    lookup = mongo_pipeline(12)[1]["$lookup"]
    assert lookup["from"] == "wisconsin2"
    assert lookup["let"] == {"lv": "$unique1"}
    assert lookup["pipeline"][-1] == {
        "$match": {"$expr": {"$eq": ["$unique1", "$$lv"]}}
    }
    unwind = mongo_pipeline(12)[2]["$unwind"]
    assert unwind["preserveNullAndEmptyArrays"] is False


def test_appendix_h_final_project_excludes_id():
    # "_id is the last attribute to be excluded in the pipeline" (§III-D)
    for expr_id in (2, 4, 5, 6, 7, 8, 9, 10):
        pipeline = mongo_pipeline(expr_id)
        projects = [s["$project"] for s in pipeline if "$project" in s]
        assert projects[-1] == {"_id": 0}


# ---------------------------------------------------------------------------
# Appendix G (Cypher): clause-sequence checks
# ---------------------------------------------------------------------------
def cypher_clauses(expr_id: int) -> list[str]:
    return [ln.split()[0] for ln in generated("cypher", expr_id).splitlines()]


@pytest.mark.parametrize(
    "expr_id,clauses",
    [
        (1, ["MATCH", "RETURN"]),
        (2, ["MATCH", "WITH", "RETURN", "LIMIT"]),
        (3, ["MATCH", "WITH", "RETURN"]),
        (4, ["MATCH", "WITH", "RETURN"]),
        (5, ["MATCH", "WITH", "WITH", "RETURN", "LIMIT"]),
        (6, ["MATCH", "WITH", "WITH", "RETURN"]),
        (7, ["MATCH", "WITH", "WITH", "RETURN"]),
        (8, ["MATCH", "WITH", "RETURN"]),
        (9, ["MATCH", "WITH", "RETURN", "LIMIT"]),
        (10, ["MATCH", "WITH", "RETURN", "LIMIT"]),
        (11, ["MATCH", "WITH", "RETURN"]),
        (12, ["MATCH", "MATCH", "WHERE", "WITH", "RETURN"]),
        (13, ["MATCH", "WITH", "RETURN"]),
    ],
)
def test_appendix_g_clause_sequences(expr_id, clauses):
    assert cypher_clauses(expr_id) == clauses


def test_appendix_g_expr6_matches_paper():
    assert generated("cypher", 6) == (
        "MATCH (t: wisconsin)\n"
        "WITH t{'unique1': t.unique1}\n"
        "WITH { 'max_unique1': max(t.unique1) } AS t\n"
        "RETURN t"
    )


def test_appendix_g_expr12_join_shape():
    q = generated("cypher", 12)
    assert "MATCH (r: wisconsin2)" in q
    assert "WHERE t.unique1 = r.unique1" in q
    assert "WITH t{.*, 'r': r}" in q
    assert q.endswith("RETURN COUNT(*) AS t")


def test_appendix_g_expr13_is_null():
    assert "WITH t WHERE t.tenPercent IS NULL" in generated("cypher", 13)


# ---------------------------------------------------------------------------
# cross-language: the parameters are identical everywhere (paper §III-D)
# ---------------------------------------------------------------------------
@pytest.mark.parametrize("lang", ALL_LANGS)
def test_parameters_shared_across_languages(lang):
    q3 = generated(lang, 3)
    for param in ("7", "2", "1"):
        assert param in q3
    q11 = generated(lang, 11)
    assert "10" in q11 and "30" in q11
