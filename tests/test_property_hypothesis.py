"""Property-based tests: random pandas expressions ≡ PolyFrame-on-Spark.

Hypothesis generates random predicates / projections / aggregations over
the Wisconsin frame; each must produce identical results through the full
rewrite → Spark SQL → Catalyst path as through pandas. Example counts are
kept modest because every example executes a real Spark query.
"""
from __future__ import annotations

import operator

import pytest
from hypothesis import HealthCheck, given, settings, strategies as st

from tests.conftest import polyframes

SLOW = settings(
    max_examples=12,
    deadline=None,
    suppress_health_check=[HealthCheck.function_scoped_fixture],
)

MOD_ATTRS = {
    "two": 2,
    "four": 4,
    "ten": 10,
    "twenty": 20,
    "onePercent": 100,
    "twentyPercent": 5,
}
OPS = {
    "eq": operator.eq,
    "ne": operator.ne,
    "gt": operator.gt,
    "lt": operator.lt,
    "ge": operator.ge,
    "le": operator.le,
}

comparison = st.builds(
    lambda attr, op, frac: (attr, op, int(frac * MOD_ATTRS[attr])),
    st.sampled_from(sorted(MOD_ATTRS)),
    st.sampled_from(sorted(OPS)),
    st.floats(min_value=0.0, max_value=0.999),
)


def apply_cmp(frame, cmp):
    attr, op, value = cmp
    return OPS[op](frame[attr], value)


@pytest.fixture(scope="module")
def spark_pf(backends):
    return polyframes(backends["sparksql"])[0]


class TestFilters:
    @SLOW
    @given(cmp=comparison)
    def test_single_comparison_count(self, spark_pf, wdata, cmp):
        assert len(spark_pf[apply_cmp(spark_pf, cmp)]) == int(
            apply_cmp(wdata, cmp).sum()
        )

    @SLOW
    @given(a=comparison, b=comparison, conj=st.booleans())
    def test_two_term_predicate_count(self, spark_pf, wdata, a, b, conj):
        if conj:
            got = spark_pf[apply_cmp(spark_pf, a) & apply_cmp(spark_pf, b)]
            want = apply_cmp(wdata, a) & apply_cmp(wdata, b)
        else:
            got = spark_pf[apply_cmp(spark_pf, a) | apply_cmp(spark_pf, b)]
            want = apply_cmp(wdata, a) | apply_cmp(wdata, b)
        assert len(got) == int(want.sum())


class TestProjections:
    @SLOW
    @given(
        cols=st.lists(
            st.sampled_from(sorted(MOD_ATTRS) + ["unique1", "stringu1"]),
            min_size=1,
            max_size=4,
            unique=True,
        )
    )
    def test_projection_columns_and_rows(self, spark_pf, wdata, cols):
        out = spark_pf[list(cols)].toPandas()
        assert list(out.columns) == list(cols)
        assert len(out) == len(wdata)
        assert sorted(out[cols[0]].astype(str)) == sorted(
            wdata[cols[0]].astype(str)
        )


class TestAggregates:
    @SLOW
    @given(
        attr=st.sampled_from(sorted(MOD_ATTRS) + ["unique1"]),
        func=st.sampled_from(["min", "max", "count"]),
    )
    def test_scalar_aggregates(self, spark_pf, wdata, attr, func):
        assert spark_pf[attr].agg(func) == getattr(wdata[attr], func)()

    @SLOW
    @given(
        key=st.sampled_from(sorted(MOD_ATTRS)),
        target=st.sampled_from(["unique1", "onePercent"]),
        func=st.sampled_from(["min", "max", "count"]),
    )
    def test_groupby_aggregates(self, spark_pf, wdata, key, target, func):
        got = (
            spark_pf.groupby(key)[target]
            .agg(func)
            .toPandas()
            .set_index(key)[f"{'count' if func == 'count' else func}_{target}"]
        )
        want = getattr(wdata.groupby(key)[target], func)()
        assert got.to_dict() == want.to_dict()


class TestArithmetic:
    @SLOW
    @given(
        attr=st.sampled_from(["unique1", "onePercent"]),
        scale=st.integers(min_value=1, max_value=9),
        op=st.sampled_from(["add", "sub", "mul", "mod"]),
    )
    def test_arithmetic_multiset(self, spark_pf, wdata, attr, scale, op):
        col = spark_pf[attr]
        series = wdata[attr]
        py = {
            "add": (col + scale, series + scale),
            "sub": (col - scale, series - scale),
            "mul": (col * scale, series * scale),
            "mod": (col % scale, series % scale),
        }[op]
        got = sorted(py[0].toPandas().iloc[:, 0])
        assert got == sorted(py[1])
