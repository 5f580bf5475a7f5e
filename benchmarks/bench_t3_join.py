"""T3 — Theorem 3.4: incremental equijoin vs full join recomputation.

orders ⋈ lineitem on orderkey. The incremental step evaluates the three
bilinear terms (Δa⋈Δb + I(a)⋈Δb + Δa⋈I(b)) — every term has a delta
input; the full recomputation joins the two complete relations.
"""
import pytest

from repro.core.operators import incremental_join_node
from repro.zset import ops as zops

from bench_common import DeltaQueue, lineitem_state_and_deltas, orders_state_and_deltas

ON = [("o_orderkey", "l_orderkey")]
PROJ = {"k": "o_orderkey", "c": "o_custkey", "p": "l_partkey", "q": "l_quantity"}


@pytest.fixture(scope="module")
def data(spark):
    li_base, li_deltas = lineitem_state_and_deltas(spark)
    o_base, o_deltas = orders_state_and_deltas(spark)
    li_full, o_full = li_base, o_base
    for d in li_deltas:
        li_full = li_full.add(d)
    for d in o_deltas:
        o_full = o_full.add(d)
    return {
        "li_deltas": li_deltas, "o_deltas": o_deltas,
        "li_full": li_full.materialize(), "o_full": o_full.materialize(),
        "li_base": li_base, "o_base": o_base,
    }


def test_t3_incremental_join_step(benchmark, data):
    """Theorem 3.4 step against pre-loaded O(R) state."""
    node = incremental_join_node(on=ON, project=PROJ)
    node.step(data["o_base"], data["li_base"])  # warm the integrals
    qo, ql = DeltaQueue(data["o_deltas"]), DeltaQueue(data["li_deltas"])
    benchmark.extra_info["state_rows"] = sum(node.state_sizes())
    benchmark.pedantic(
        lambda: node.step(qo.next(), ql.next()).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )


def test_t3_full_join_recompute(benchmark, data):
    """The lifted non-incremental join: both full relations every step."""
    def full():
        j = zops.join_z(data["o_full"], data["li_full"], on=ON)
        return zops.map_z(j, PROJ).consolidate().df.count()

    benchmark.extra_info["o_rows"] = data["o_full"].df.count()
    benchmark.extra_info["li_rows"] = data["li_full"].df.count()
    benchmark.pedantic(full, rounds=4, iterations=1, warmup_rounds=1)
