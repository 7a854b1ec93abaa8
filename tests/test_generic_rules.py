"""Generic rules (paper §III-C-2): describe() and get_dummies().

Generic rules are not templates in the language configs — they are
composed at runtime from chains of language-specific rules. Both are
exercised on every backend and checked against pandas.
"""
from __future__ import annotations

import pandas as pd
import pytest

from tests.conftest import polyframes

NUMERIC_SUBSET = ["unique1", "two", "onePercent"]


class TestDescribe:
    def test_shape_and_stats_index(self, backend):
        _, conn = backend
        pf, _ = polyframes(conn)
        d = pf.describe(columns=NUMERIC_SUBSET)
        assert list(d.index) == ["count", "avg", "std", "min", "max"]
        assert list(d.columns) == NUMERIC_SUBSET

    @pytest.mark.parametrize("col", NUMERIC_SUBSET)
    def test_count_min_max_avg_match_pandas(self, backend, wdata, col):
        _, conn = backend
        pf, _ = polyframes(conn)
        d = pf.describe(columns=[col])
        assert d.loc["count", col] == wdata[col].count()
        assert d.loc["min", col] == wdata[col].min()
        assert d.loc["max", col] == wdata[col].max()
        assert d.loc["avg", col] == pytest.approx(wdata[col].mean())

    def test_std_kind_matches_language_declaration(self, backend, wdata):
        """Paper Fig. 3 row 7: STDDEV (sample) for SQL++/SQL vs
        stdDevPop/stDevP (population) for MongoDB/Cypher."""
        name, conn = backend
        pf, _ = polyframes(conn)
        d = pf.describe(columns=["unique1"])
        ddof = 1 if conn.rules.meta("std_kind") == "sample" else 0
        assert d.loc["std", "unique1"] == pytest.approx(
            wdata["unique1"].std(ddof=ddof)
        )

    def test_describe_skips_missing_in_count(self, backend, wdata):
        _, conn = backend
        pf, _ = polyframes(conn)
        d = pf.describe(columns=["tenPercent"])
        assert d.loc["count", "tenPercent"] == wdata["tenPercent"].count()

    def test_describe_infers_numeric_columns(self, backend):
        _, conn = backend
        pf, _ = polyframes(conn)
        d = pf.describe()
        assert "unique1" in d.columns
        assert "stringu1" not in d.columns  # strings are not described

    def test_describe_is_single_query(self, backend):
        name, conn = backend
        pf, _ = polyframes(conn)
        sent = []
        original = conn.send_query
        conn.send_query = lambda q, n, c: (sent.append(q), original(q, n, c))[1]
        try:
            pf.describe(columns=NUMERIC_SUBSET)
        finally:
            conn.send_query = original
        assert len(sent) == 1  # one composed query, not 15


class TestGetDummies:
    def test_one_hot_matches_pandas(self, backend, wdata):
        _, conn = backend
        pf, _ = polyframes(conn)
        got = pf["four"].get_dummies().toPandas()
        want = pd.get_dummies(wdata["four"]).astype(int)
        assert sorted(got.columns) == [f"four_{v}" for v in sorted(want.columns)]
        assert got.shape[0] == len(wdata)
        for v in want.columns:
            assert int(got[f"four_{v}"].sum()) == int(want[v].sum())

    def test_rows_are_exactly_one_hot(self, backend):
        _, conn = backend
        pf, _ = polyframes(conn)
        got = pf["two"].get_dummies().toPandas()
        assert (got.sum(axis=1) == 1).all()
        assert set(got.values.ravel().tolist()) <= {0, 1}

    def test_get_dummies_on_string_column(self, backend, wdata):
        _, conn = backend
        pf, _ = polyframes(conn)
        got = pf["string4"].get_dummies().toPandas()
        assert got.shape[1] == wdata["string4"].nunique()

    def test_projection_is_lazy(self, backend):
        """get_dummies runs one distinct query; the projection itself is a
        transformation until materialized."""
        _, conn = backend
        pf, _ = polyframes(conn)
        sent = []
        original = conn.send_query
        conn.send_query = lambda q, n, c: (sent.append(q), original(q, n, c))[1]
        try:
            lazy = pf["two"].get_dummies()
            assert len(sent) == 1  # distinct-values action only
            lazy.head(2)
            assert len(sent) == 2
        finally:
            conn.send_query = original
