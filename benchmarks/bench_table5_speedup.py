"""Table V / Figure 9 benchmark: speedup — fixed data, growing "cluster".

The paper runs the XL dataset on 1–4 EC2 nodes; here a node count N is
simulated as N input partitions + N shuffle partitions inside the local
session (DESIGN.md §2 substitution 2): with the data fixed, more
simulated nodes should cut runtimes toward ideal 1/N for the scan-bound
expressions. Regenerates with:
    pytest benchmarks/bench_table5_speedup.py --benchmark-only
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

EXPR_IDS = (1, 3, 12)
NODES = (1, 2, 4)


@pytest.fixture(scope="module")
def node_backends(spark, datasets):
    """node count -> Spark backend holding the fixed XL dataset in that
    many partitions."""
    xl = datasets["XL"]
    conns = {}
    for n in NODES:
        sdf = spark.createDataFrame(xl).repartition(n).cache()
        sdf.count()  # materialize the "cluster layout" outside timings
        conn = make_connector("sparksql", spark)
        register_dataset(conn, sdf, sdf)
        conns[n] = conn
    yield conns
    spark.catalog.clearCache()


@pytest.mark.parametrize("nodes", NODES)
@pytest.mark.parametrize("expr_id", EXPR_IDS)
def test_speedup(benchmark, spark, node_backends, nodes, expr_id):
    e = BY_ID[expr_id]
    benchmark.group = f"table5-speedup-expr{expr_id:02d}-{e.name}"
    conn = node_backends[nodes]
    pf = PolyFrame(NAMESPACE, COLLECTION, conn)
    pf2 = PolyFrame(NAMESPACE, COLLECTION + "2", conn)

    def run():
        with simulated_nodes(spark, nodes):
            return e.poly_fn(pf, pf2)

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
