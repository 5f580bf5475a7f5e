"""T4 — Proposition 4.7: incremental distinct does O(|change|) work.

distinct(π_partkey,flag(lineitem)). The H-based operator probes its O(R)
integral only at the change's rows; the brute-force version
(D ∘ ↑distinct ∘ I — Definition 3.1 literally) re-distincts the whole
accumulated projection every step.
"""
import pytest

from repro.core.backend import SparkZSetOps
from repro.core.circuit import BruteIncremental, IncrementalDistinct
from repro.zset import ops as zops

from bench_common import DeltaQueue, lineitem_state_and_deltas


def proj(z):
    return zops.map_z(z, {"p": "l_partkey", "flag": "l_returnflag"})


@pytest.fixture(scope="module")
def data(spark):
    base, deltas = lineitem_state_and_deltas(spark)
    return {
        "base": proj(base).materialize(),
        "deltas": [proj(d).materialize() for d in deltas],
    }


def test_t4_incremental_distinct_step(benchmark, data):
    node = IncrementalDistinct(SparkZSetOps())
    node.step(data["base"])  # load O(R) state
    q = DeltaQueue(data["deltas"])
    benchmark.extra_info["state_rows"] = node.state_size()
    benchmark.pedantic(
        lambda: node.step(q.next()).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )


def test_t4_brute_force_distinct_step(benchmark, data):
    node = BruteIncremental(SparkZSetOps(), lambda z: z.distinct())
    node.step(data["base"])
    q = DeltaQueue(data["deltas"])
    benchmark.extra_info["integral_rows"] = node.integral_sizes()[0]
    benchmark.pedantic(
        lambda: node.step(q.next()).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )
