"""PolyFrame: Pandas-like dataframes via incremental query formation.

This is the paper's core contribution (§III). A :class:`PolyFrame` holds no
data — only the query text accumulated so far (``self.query``) plus the
connector that will eventually run it. Every Pandas-style operation is
either a

* **transformation** — applies a rewrite rule to the current query and
  returns a *new* PolyFrame (``pf['a']``, ``pf[pf['a'] == 1]``,
  ``groupby``, ``sort_values``, ``merge``, arithmetic/comparison on
  columns, ``get_dummies``) — no query is executed, no intermediate
  result materializes; or an
* **action** — finalizes the query (e.g. appends the language's LIMIT
  rule) and ships it through the connector (``head``, ``toPandas``,
  ``len(pf)``, scalar aggregates, ``describe``).

Column expressions mirror Table I of the paper: ``pf['lang'] == 'en'``
produces a boolean *column* whose own query is built on the projection's
query (Table I row 3), but which also remembers the originating frame's
query and the raw predicate so that ``pf[pf['lang'] == 'en']`` composes a
filter over the *base* frame (Table I footnote 1).
"""
from __future__ import annotations

from typing import Callable

import pandas as pd

from .connector import DBConnector
from .rewrite import RewriteRules

#: pandas-style aggregate name -> rewrite-rule key
_AGG_RULES = {
    "min": "min",
    "max": "max",
    "avg": "avg",
    "mean": "avg",
    "std": "std",
    "count": "count",
}

#: python callables accepted by ``map`` -> rewrite-rule key
_MAP_RULES: dict[object, str] = {
    str.upper: "upper",
    str.lower: "lower",
    abs: "abs",
    "upper": "upper",
    "lower": "lower",
    "abs": "abs",
}

_NUMERIC_DTYPE_MARKERS = ("int", "long", "float", "double", "decimal", "real")


def _is_numeric_dtype(dtype: str) -> bool:
    d = dtype.lower()
    return any(m in d for m in _NUMERIC_DTYPE_MARKERS)


def _native(value: object) -> object:
    """Convert numpy scalars to python natives for literal formatting."""
    item = getattr(value, "item", None)
    return item() if callable(item) else value


class PolyFrame:
    """A lazy, query-backed dataframe over one backend dataset."""

    def __init__(
        self,
        namespace: str,
        collection: str,
        connector: DBConnector,
        rules: RewriteRules | None = None,
        _query: str | None = None,
    ):
        self.namespace = namespace
        self.collection = collection
        self.connector = connector
        self.rules = rules if rules is not None else connector.rules
        if _query is None:
            # Frame creation only verifies the dataset and forms q1 — it
            # never loads data (the paper's "DataFrame creation time" for
            # PolyFrame is query-formation time only).
            connector.initialize(namespace, collection)
            _query = self.rules.apply(
                "q1", namespace=namespace, collection=collection
            )
        self.query = _query

    # ------------------------------------------------------------------
    # plumbing
    # ------------------------------------------------------------------
    def _frame(self, query: str) -> "PolyFrame":
        return PolyFrame(
            self.namespace, self.collection, self.connector, self.rules, _query=query
        )

    def _column(self, query: str, expr: str, name: str, base_query: str) -> "PolyFrameColumn":
        return PolyFrameColumn(
            self.namespace,
            self.collection,
            self.connector,
            self.rules,
            _query=query,
            expr=expr,
            name=name,
            base_query=base_query,
        )

    def _execute(self, query: str) -> pd.DataFrame:
        return self.connector.execute(query, self.namespace, self.collection)

    def _finalized(self, query: str) -> str:
        """Wrap a non-terminal query with the language's return-all rule."""
        return self.rules.apply("return_all", subquery=query)

    def _group_extras(self, attrs: list[str]) -> dict[str, str]:
        """grp_key / grp_restore variables for languages that define them
        (MongoDB's $group needs the keys packed into _id and restored)."""
        extras: dict[str, str] = {}
        for rule, var in (("grp_key", "grp_key"), ("grp_restore", "grp_restore")):
            if self.rules.has(rule):
                extras[var] = self.rules.join_items(
                    [self.rules.apply(rule, attribute=a) for a in attrs]
                )
        return extras

    def _agg_item(self, func: str, attribute: str) -> str:
        """One aliased aggregate output, e.g. ``MAX(t.four) AS max_four``."""
        rule = _AGG_RULES.get(func)
        if rule is None:
            raise ValueError(
                f"unsupported aggregate {func!r}; choose from {sorted(_AGG_RULES)}"
            )
        fragment = self.rules.apply(rule, attribute=attribute)
        return self.rules.apply(
            "attribute_alias", alias=f"{rule}_{attribute}", attribute=fragment
        )

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return (
            f"<{type(self).__name__} {self.namespace}.{self.collection} "
            f"[{self.rules.meta('language')}]\n{self.query}>"
        )

    # ------------------------------------------------------------------
    # transformations
    # ------------------------------------------------------------------
    def __getitem__(self, key):
        if isinstance(key, PolyFrameColumn):
            # selection: pf[bool_col] — composed over THIS frame's query,
            # with the column's raw predicate (Table I footnote 1).
            return self._frame(
                self.rules.apply("q6", subquery=self.query, statement=key.expr)
            )
        if isinstance(key, str):
            proj = self.rules.apply("proj_attr", attribute=key)
            query = self.rules.apply("q2", subquery=self.query, attribute_alias=proj)
            expr = self.rules.apply("single_attribute", attribute=key)
            return self._column(query, expr=expr, name=key, base_query=self.query)
        if isinstance(key, (list, tuple)):
            items = [self.rules.apply("proj_attr", attribute=a) for a in key]
            return self._frame(
                self.rules.apply(
                    "q2",
                    subquery=self.query,
                    attribute_alias=self.rules.join_items(items),
                )
            )
        raise TypeError(f"unsupported key type: {type(key).__name__}")

    def sort_values(self, by: str, ascending: bool = True) -> "PolyFrame":
        if not isinstance(by, str):
            raise TypeError("sort_values supports a single attribute name")
        if ascending:
            attr = self.rules.apply("sort_asc_attr", attribute=by)
            return self._frame(
                self.rules.apply("q5", subquery=self.query, sort_asc_attr=attr)
            )
        attr = self.rules.apply("sort_desc_attr", attribute=by)
        return self._frame(
            self.rules.apply("q4", subquery=self.query, sort_desc_attr=attr)
        )

    def groupby(self, by: str | list[str]) -> "PolyFrameGroupBy":
        attrs = [by] if isinstance(by, str) else list(by)
        return PolyFrameGroupBy(self, attrs)

    def merge(
        self,
        other: "PolyFrame",
        on: str | None = None,
        left_on: str | None = None,
        right_on: str | None = None,
        how: str = "inner",
    ) -> "PolyFrame":
        """Equi-join, like ``pd.merge`` (inner only, as in the paper)."""
        if how != "inner":
            raise ValueError("only inner joins are supported (paper's expr. 12)")
        if on is not None:
            left_on = right_on = on
        if left_on is None or right_on is None:
            raise ValueError("merge requires `on` or both `left_on`/`right_on`")
        return self._frame(
            self.rules.apply(
                "q10",
                left_query=self.query,
                right_query=other.query,
                left_on=left_on,
                right_on=right_on,
                other_collection=other.collection,
            )
        )

    # ------------------------------------------------------------------
    # actions
    # ------------------------------------------------------------------
    def head(self, n: int = 5) -> pd.DataFrame:
        """Return the first ``n`` rows (appends the language's LIMIT rule)."""
        return self._execute(self.rules.apply("limit", subquery=self.query, num=n))

    def toPandas(self) -> pd.DataFrame:
        """Materialize the full result (the return-all rule)."""
        return self._execute(self._finalized(self.query))

    collect = toPandas

    def __len__(self) -> int:
        result = self._execute(self.rules.apply("q3", subquery=self.query))
        return int(result.iloc[0, 0])

    def describe(self, columns: list[str] | None = None) -> pd.DataFrame:
        """Summary statistics — a *generic rule* (paper §III-C-2): composed
        from the language-specific aggregate rules 3–7 of Fig. 3, chained
        with ``attribute_separator``, then folded through q8. Returns a
        pandas-describe-shaped frame (stats × attributes)."""
        if columns is None:
            columns = [
                c
                for c, d in self.connector.get_columns(self.namespace, self.collection)
                if _is_numeric_dtype(d)
            ]
        stats = ("count", "avg", "std", "min", "max")
        items = [self._agg_item(f, c) for c in columns for f in stats]
        query = self.rules.apply(
            "q8", subquery=self.query, agg_func=self.rules.join_items(items)
        )
        row = self._execute(self._finalized(query)).iloc[0]
        return pd.DataFrame(
            {c: [row[f"{f}_{c}"] for f in stats] for c in columns},
            index=list(stats),
        )


class PolyFrameColumn(PolyFrame):
    """A single (possibly computed) column of a PolyFrame.

    Carries three pieces of state beyond the frame: ``expr`` — the
    language-specific fragment denoting this column inside a larger
    statement; ``name`` — its output alias; and ``base_query`` — the query
    of the frame it was derived from, used when the column is a predicate
    applied back to that frame.
    """

    def __init__(self, *args, expr: str, name: str, base_query: str, **kwargs):
        super().__init__(*args, **kwargs)
        self.expr = expr
        self.name = name
        self.base_query = base_query

    # -- expression building -------------------------------------------
    def _operand(self, other: object) -> str:
        """Render the right-hand operand of a binary op."""
        if isinstance(other, PolyFrameColumn):
            if self.rules.has("col_ref"):
                # languages (MongoDB) whose operator templates take bare
                # field names on the left need an explicit reference form
                # for a column on the right.
                return self.rules.apply("col_ref", attribute=other.name)
            return other.expr
        return self.rules.literal(_native(other))

    def _binary(self, rule: str, other: object) -> "PolyFrameColumn":
        expr = self.rules.apply(rule, left=self.expr, right=self._operand(other))
        # Table I row 3: a value column composes over the *projection's*
        # query (2); only a column-column op needs the base frame, where
        # both operand attributes are in scope.
        subquery = (
            self.base_query if isinstance(other, PolyFrameColumn) else self.query
        )
        query = self.rules.apply("q7", subquery=subquery, statement=expr, alias="val")
        return self._column(query, expr=expr, name="val", base_query=self.base_query)

    def _combine(self, rule: str, other: "PolyFrameColumn") -> "PolyFrameColumn":
        expr = self.rules.apply(rule, left=self.expr, right=other.expr)
        query = self.rules.apply(
            "q7", subquery=self.base_query, statement=expr, alias="val"
        )
        return self._column(query, expr=expr, name="val", base_query=self.base_query)

    # comparisons — each returns a boolean column (Table I row 3)
    def __eq__(self, other):  # type: ignore[override]
        return self._binary("eq", other)

    def __ne__(self, other):  # type: ignore[override]
        return self._binary("ne", other)

    def __gt__(self, other):
        return self._binary("gt", other)

    def __lt__(self, other):
        return self._binary("lt", other)

    def __ge__(self, other):
        return self._binary("ge", other)

    def __le__(self, other):
        return self._binary("le", other)

    __hash__ = None  # boolean columns are not hashable, like pandas Series

    # logicals
    def __and__(self, other):
        return self._combine("and", other)

    def __or__(self, other):
        return self._combine("or", other)

    def __invert__(self):
        expr = self.rules.apply("not", left=self.expr)
        query = self.rules.apply(
            "q7", subquery=self.base_query, statement=expr, alias="val"
        )
        return self._column(query, expr=expr, name="val", base_query=self.base_query)

    # arithmetic
    def __add__(self, other):
        return self._binary("add", other)

    def __sub__(self, other):
        return self._binary("sub", other)

    def __mul__(self, other):
        return self._binary("mul", other)

    def __truediv__(self, other):
        return self._binary("div", other)

    def __mod__(self, other):
        return self._binary("mod", other)

    # missing-data predicates (paper's added benchmark expression 13)
    def isna(self) -> "PolyFrameColumn":
        expr = self.rules.apply("is_missing", left=self.expr)
        query = self.rules.apply("q7", subquery=self.query, statement=expr, alias="val")
        return self._column(query, expr=expr, name="val", base_query=self.base_query)

    def notna(self) -> "PolyFrameColumn":
        expr = self.rules.apply("not_missing", left=self.expr)
        query = self.rules.apply("q7", subquery=self.query, statement=expr, alias="val")
        return self._column(query, expr=expr, name="val", base_query=self.base_query)

    # scalar functions
    def map(self, func: Callable | str) -> "PolyFrameColumn":
        """Apply a supported scalar function (e.g. ``str.upper``) — rewritten
        through the language's FUNCTIONS rules, composed over this column's
        own projection query (paper's benchmark expression 5)."""
        rule = _MAP_RULES.get(func)
        if rule is None:
            raise ValueError(f"unsupported map function: {func!r}")
        expr = self.rules.apply(rule, statement=self.expr, attribute=self.name)
        query = self.rules.apply(
            "q7", subquery=self.query, statement=expr, alias=self.name
        )
        ref = self.rules.apply("single_attribute", attribute=self.name)
        return self._column(query, expr=ref, name=self.name, base_query=query)

    def astype(self, target: type | str) -> "PolyFrameColumn":
        rule = {int: "to_int", str: "to_str", "int": "to_int", "str": "to_str"}.get(
            target
        )
        if rule is None:
            raise ValueError(f"unsupported astype target: {target!r}")
        expr = self.rules.apply(rule, statement=self.expr)
        query = self.rules.apply(
            "q7", subquery=self.query, statement=expr, alias=self.name
        )
        ref = self.rules.apply("single_attribute", attribute=self.name)
        return self._column(query, expr=ref, name=self.name, base_query=query)

    # -- aggregate actions ----------------------------------------------
    def agg(self, func: str):
        """Scalar aggregate over this column (action)."""
        item = self._agg_item(func, self.name)
        query = self.rules.apply("q8", subquery=self.query, agg_func=item)
        result = self._execute(self._finalized(query))
        return _native(result.iloc[0, 0])

    def max(self):
        return self.agg("max")

    def min(self):
        return self.agg("min")

    def mean(self):
        return self.agg("avg")

    def std(self):
        return self.agg("std")

    def count(self):
        return self.agg("count")

    # -- generic rule: one-hot encoding ----------------------------------
    def get_dummies(self) -> PolyFrame:
        """One-hot encode this column — a *generic rule* (paper §III-C-2):
        an action fetches the distinct values (q11), then the projection is
        composed from comparison + type-conversion + alias rewrite rules.
        Returns a lazy PolyFrame (the projection itself is a transformation).
        """
        distinct_q = self.rules.apply(
            "q11",
            subquery=self.base_query,
            attribute=self.name,
            **self._group_extras([self.name]),
        )
        values = self._execute(self._finalized(distinct_q))
        distinct = sorted(
            {_native(v) for v in values.iloc[:, 0].dropna().tolist()},
            key=lambda v: (str(type(v)), v),
        )
        items = []
        for v in distinct:
            cmp_expr = self.rules.apply(
                "eq", left=self.expr, right=self.rules.literal(v)
            )
            int_expr = self.rules.apply("to_int", statement=cmp_expr)
            alias = f"{self.name}_{v}"
            items.append(
                self.rules.apply("attribute_alias", alias=alias, attribute=int_expr)
            )
        query = self.rules.apply(
            "q2", subquery=self.base_query, attribute_alias=self.rules.join_items(items)
        )
        return self._frame(query)


class PolyFrameGroupBy:
    """Deferred ``groupby`` — resolves to a q9 group-by query on ``agg``."""

    def __init__(self, frame: PolyFrame, by: list[str], target: str | None = None):
        self._frame = frame
        self._by = by
        self._target = target

    def __getitem__(self, column: str) -> "PolyFrameGroupBy":
        return PolyFrameGroupBy(self._frame, self._by, target=column)

    def agg(self, func: str) -> PolyFrame:
        """Group-by aggregate (transformation — returns a lazy PolyFrame).

        Like the paper's benchmark rewrites, ``agg`` without a selected
        column aggregates the grouping attribute itself (Appendix E #4).
        """
        frame, rules = self._frame, self._frame.rules
        target = self._target if self._target is not None else self._by[0]
        grp_items = [
            rules.apply("grp_attr", attribute=a)
            if rules.has("grp_attr")
            else rules.apply("single_attribute", attribute=a)
            for a in self._by
        ]
        query = rules.apply(
            "q9",
            subquery=frame.query,
            grp_attribute=rules.join_items(grp_items),
            agg_func=frame._agg_item(func, target),
            **frame._group_extras(self._by),
        )
        return frame._frame(query)
