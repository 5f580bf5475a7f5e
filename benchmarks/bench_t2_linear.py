"""T2 — Theorem 3.3: a linear query's incremental step costs O(|change|).

The query is the σ+π pipeline over lineitem. The incremental version of a
linear query IS the query applied to the delta (Q^Δ = Q); the full
recomputation applies the same query to the whole accumulated relation.
"""
import pytest

from repro.zset import ops as zops

from bench_common import DeltaQueue, lineitem_state_and_deltas


def linear_query(z):
    f = zops.filter_z(z, "l_quantity > 25 AND l_discount < 0.05")
    return zops.map_z(f, {"k": "l_orderkey", "p": "l_partkey", "flag": "l_returnflag"})


@pytest.fixture(scope="module")
def data(spark):
    base, deltas = lineitem_state_and_deltas(spark)
    full = base
    for d in deltas:
        full = full.add(d)
    return {"base": base, "deltas": deltas, "full": full.materialize()}


def test_t2_incremental_step(benchmark, data):
    """Work ∝ |Δ| = 1k rows: apply the linear query to the change only."""
    q = DeltaQueue(data["deltas"])
    benchmark.extra_info["delta_rows"] = 1000
    benchmark.pedantic(
        lambda: linear_query(q.next()).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )


def test_t2_full_recompute_step(benchmark, data):
    """Work ∝ |DB| ≈ 600k rows: recompute the view from the snapshot."""
    benchmark.extra_info["db_rows"] = data["full"].df.count()
    benchmark.pedantic(
        lambda: linear_query(data["full"]).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )
