"""T6 — §5.1: naïve vs semi-naïve transitive closure (one full fixpoint).

Layered DAG so the fixpoint takes a fixed number of iterations; the
naïve loop recomputes the full candidate closure each iteration, the
semi-naïve loop (circuit 5.1) touches only newly derived facts.
"""
import pytest

from repro import synth_data
from repro.core.backend import SparkZSetOps
from repro.core.recursion import IncBody, naive_fixpoint, semi_naive_fixpoint
from repro.zset.frame import ZSet

from repro.core.tc import tc_base_fn, tc_body, tc_join_fn

SOPS = SparkZSetOps()


@pytest.fixture(scope="module")
def graph(spark):
    edges = synth_data.layered_dag_edges(layers=8, width=40, fanout=2, seed=21)
    ze = ZSet.from_rows(spark, [(h, t, 1) for h, t in edges], "h int, t int").materialize()
    zero = ZSet.empty(spark, "s int, t int")
    return {"edges": ze, "zero": zero, "n_edges": len(edges)}


def test_t6_naive_tc(benchmark, graph):
    benchmark.extra_info["n_edges"] = graph["n_edges"]
    benchmark.pedantic(
        lambda: naive_fixpoint(SOPS, tc_body(graph["edges"]), graph["zero"]),
        rounds=2, iterations=1, warmup_rounds=0,
    )


def test_t6_semi_naive_tc(benchmark, graph):
    benchmark.extra_info["n_edges"] = graph["n_edges"]

    def run():
        body = IncBody(SOPS, base_fn=tc_base_fn, join_fn=tc_join_fn)
        return semi_naive_fixpoint(SOPS, body, graph["edges"])

    benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=0)
