"""T5 — Algorithm 4.8 end-to-end: §4.4-style view over TPC-H-lite.

SELECT DISTINCT o_custkey, l_partkey
FROM orders JOIN lineitem ON o_orderkey = l_orderkey
WHERE o_totalprice > 100000 AND l_quantity > 25

The compiled incremental circuit (σ/π linear, Thm-3.4 join, Prop-4.7
distinct) processes 1k-row deltas; the baseline re-evaluates the lifted
circuit over the full snapshots every step.
"""
import pytest

from repro.sql import translate as t
from repro.sql.compile import IncrementalView, evaluate

from bench_common import DeltaQueue, lineitem_state_and_deltas, orders_state_and_deltas


def view_ast() -> t.Node:
    return t.t_project(
        t.t_join(
            t.t_select(t.Rel("orders"), "o_totalprice > 100000"),
            t.t_select(t.Rel("lineitem"), "l_quantity > 25"),
            on=[("o_orderkey", "l_orderkey")],
        ),
        {"c": "o_custkey", "p": "l_partkey"},
    )


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
        "li_base": li_base, "o_base": o_base,
        "li_deltas": li_deltas, "o_deltas": o_deltas,
        "li_full": li_full.materialize(), "o_full": o_full.materialize(),
    }


def test_t5_incremental_view_step(benchmark, data):
    iv = IncrementalView(view_ast())
    iv.step({"orders": data["o_base"], "lineitem": data["li_base"]})
    qo, ql = DeltaQueue(data["o_deltas"]), DeltaQueue(data["li_deltas"])
    benchmark.extra_info["state_rows"] = sum(iv.state_sizes().values())
    benchmark.pedantic(
        lambda: iv.step(
            {"orders": qo.next(), "lineitem": ql.next()}
        ).df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )


def test_t5_full_view_recompute(benchmark, data):
    ast = t.consolidate_distincts(view_ast())
    inputs = {"orders": data["o_full"], "lineitem": data["li_full"]}
    benchmark.pedantic(
        lambda: evaluate(ast, inputs).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )
