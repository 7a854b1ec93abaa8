"""Table V / Figure 10 benchmark: scaleup — data grows with the "cluster".

The paper grows the dataset 10→40 GB as nodes grow 1→4; ideal scaleup
keeps runtimes flat. Here node count N carries N× the XS-scaled base
volume in N partitions (DESIGN.md §2 substitution 2). Regenerates with:
    pytest benchmarks/bench_table5_scaleup.py --benchmark-only
"""
from __future__ import annotations

import pytest

from repro.bench.expressions import BY_ID
from repro.bench.harness import (
    COLLECTION,
    NAMESPACE,
    make_connector,
    register_dataset,
    simulated_nodes,
)
from repro.core import PolyFrame
from repro.wisconsin.generator import wisconsin_pdf

EXPR_IDS = (1, 3, 12)
NODES = (1, 2, 4)
BASE_N = 10_000  # per-node volume (XL/5 at benchmark scale)


@pytest.fixture(scope="module")
def scaled_backends(spark):
    conns = {}
    for n in NODES:
        pdf = wisconsin_pdf(BASE_N * n, seed=42)
        sdf = spark.createDataFrame(pdf).repartition(n).cache()
        sdf.count()
        conn = make_connector("sparksql", spark)
        register_dataset(conn, sdf, sdf)
        conns[n] = conn
    yield conns
    spark.catalog.clearCache()


@pytest.mark.parametrize("nodes", NODES)
@pytest.mark.parametrize("expr_id", EXPR_IDS)
def test_scaleup(benchmark, spark, scaled_backends, nodes, expr_id):
    e = BY_ID[expr_id]
    benchmark.group = f"table5-scaleup-expr{expr_id:02d}-{e.name}"
    conn = scaled_backends[nodes]
    pf = PolyFrame(NAMESPACE, COLLECTION, conn)
    pf2 = PolyFrame(NAMESPACE, COLLECTION + "2", conn)

    def run():
        with simulated_nodes(spark, nodes):
            return e.poly_fn(pf, pf2)

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
