"""DuckDB database connector — PostgreSQL stand-in (DESIGN.md §2).

The paper's SQL backend is PostgreSQL v12; no server is available offline,
so the PostgreSQL-dialect queries from ``sql.ini`` (double-quoted
identifiers, nested derived tables — the paper's Appendix F shapes) are
executed on an embedded DuckDB database, which accepts the same dialect
and, like PostgreSQL, has a real optimizer that flattens the nested
subqueries instead of materializing them.
"""
from __future__ import annotations

import duckdb
import pandas as pd

from repro.core.connector import DatasetNotRegistered, DBConnector
from repro.core.rewrite import RewriteRules


class DuckDBConnector(DBConnector):
    """Executes PolyFrame's generated SQL on an embedded DuckDB."""

    language = "sql"

    def __init__(
        self,
        con: "duckdb.DuckDBPyConnection | None" = None,
        rules: RewriteRules | None = None,
    ):
        super().__init__(rules)
        self.con = con if con is not None else duckdb.connect()
        self._registered: set[tuple[str, str]] = set()

    def register(self, namespace: str, collection: str, data) -> None:
        """Load a pandas (or Spark) DataFrame as table namespace.collection."""
        pdf = data if isinstance(data, pd.DataFrame) else data.toPandas()
        self.con.execute(f'CREATE SCHEMA IF NOT EXISTS "{namespace}"')
        self.con.register("_polyframe_staging", pdf)
        self.con.execute(
            f'CREATE OR REPLACE TABLE "{namespace}"."{collection}" '
            "AS SELECT * FROM _polyframe_staging"
        )
        self.con.unregister("_polyframe_staging")
        self._registered.add((namespace, collection))

    def initialize(self, namespace: str, collection: str) -> None:
        hit = self.con.execute(
            "SELECT COUNT(*) FROM information_schema.tables "
            "WHERE table_schema = ? AND table_name = ?",
            [namespace, collection],
        ).fetchone()[0]
        if not hit:
            raise DatasetNotRegistered(f"{namespace}.{collection}")

    def send_query(self, query: str, namespace: str, collection: str) -> pd.DataFrame:
        return self.con.execute(query).fetchdf()

    def get_columns(self, namespace: str, collection: str) -> list[tuple[str, str]]:
        rows = self.con.execute(
            "SELECT column_name, data_type FROM information_schema.columns "
            "WHERE table_schema = ? AND table_name = ? ORDER BY ordinal_position",
            [namespace, collection],
        ).fetchall()
        return [(c, d) for c, d in rows]
