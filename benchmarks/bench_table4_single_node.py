"""Table IV / Figures 6–8 benchmark: single-node data-scaling sweep.

Runs representative expressions over the five Table IV dataset sizes
(scaled ×1/100: XS=5k … XL=50k records) on Pandas and PolyFrame-on-Spark,
reproducing the shape of the single-node scalability figures: Pandas'
expression times grow with data size while remaining fast in memory;
PolyFrame's lazy queries scale through the backend. (The paper's Pandas
out-of-memory failures at M/L/XL cannot manifest at laptop scale — see
EXPERIMENTS.md.) Regenerates with:
    pytest benchmarks/bench_table4_single_node.py --benchmark-only
"""
from __future__ import annotations

import pytest

from repro.bench.expressions import BY_ID
from repro.bench.harness import COLLECTION, NAMESPACE, make_connector, register_dataset
from repro.core import PolyFrame

#: one representative expression per class: scan-count, filter, sort+limit,
#: join, and missing-data count
EXPR_IDS = (1, 3, 9, 12, 13)
SIZES = ("XS", "S", "M", "L", "XL")


@pytest.fixture(scope="module")
def spark_backends(spark, datasets):
    conns = {}
    for name, pdf in datasets.items():
        conn = make_connector("sparksql", spark)
        register_dataset(conn, pdf, pdf)
        conns[name] = conn
    return conns


@pytest.mark.parametrize("size", SIZES)
@pytest.mark.parametrize("expr_id", EXPR_IDS)
def test_pandas_scaling(benchmark, datasets, size, expr_id):
    e = BY_ID[expr_id]
    benchmark.group = f"table4-expr{expr_id:02d}-{e.name}"
    df = datasets[size]
    benchmark.pedantic(
        lambda: e.pandas_fn(df, df), rounds=3, iterations=1, warmup_rounds=1
    )


@pytest.mark.parametrize("size", SIZES)
@pytest.mark.parametrize("expr_id", EXPR_IDS)
def test_polyframe_spark_scaling(benchmark, spark_backends, size, expr_id):
    e = BY_ID[expr_id]
    benchmark.group = f"table4-expr{expr_id:02d}-{e.name}"
    conn = spark_backends[size]
    pf = PolyFrame(NAMESPACE, COLLECTION, conn)
    pf2 = PolyFrame(NAMESPACE, COLLECTION + "2", conn)
    benchmark.pedantic(
        lambda: e.poly_fn(pf, pf2), rounds=3, iterations=1, warmup_rounds=1
    )
