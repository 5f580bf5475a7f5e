"""T8 — §7.2/§7.4: linear vs non-linear aggregates under change streams.

* GROUP-BY SUM via the changed-groups-only operator (work ∝ changed
  groups) vs the brute-force ``D ∘ agg ∘ I`` (work ∝ all groups);
* MIN has no better-than-brute-force incremental version — its per-step
  cost tracks the database size, the paper's stated exception.
"""
import pytest

from repro.core.backend import SparkZSetOps
from repro.core.circuit import BruteIncremental
from repro.core.operators import IncrementalGroupAggregate
from repro.zset import aggregates

from bench_common import DeltaQueue, lineitem_state_and_deltas

SOPS = SparkZSetOps()
KEYS = ["l_partkey"]
AGGS = [("total_qty", "sum", "l_quantity"), ("n", "count", None)]


@pytest.fixture(scope="module")
def data(spark):
    base, deltas = lineitem_state_and_deltas(spark)
    return {"base": base, "deltas": deltas}


def test_t8_grouped_sum_incremental(benchmark, data):
    node = IncrementalGroupAggregate(KEYS, AGGS)
    node.step(data["base"])
    q = DeltaQueue(data["deltas"])
    benchmark.extra_info["state_rows"] = node.state_size()
    benchmark.pedantic(
        lambda: node.step(q.next()).df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )


def test_t8_grouped_sum_brute_force(benchmark, data):
    node = BruteIncremental(SOPS, lambda z: aggregates.group_agg(z, KEYS, AGGS))
    node.step(data["base"])
    q = DeltaQueue(data["deltas"])
    benchmark.pedantic(
        lambda: node.step(q.next()).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )


def test_t8_min_brute_force(benchmark, data, spark):
    """§7.2: (↑a_MIN)^Δ must integrate — O(R) per step by construction."""
    from repro.zset.frame import ZSet

    def min_singleton(z):
        m = aggregates.agg_min(z, "l_extendedprice")
        return ZSet.from_rows(spark, [(float(m), 1)], "m double")

    node = BruteIncremental(SOPS, min_singleton)
    node.step(data["base"])
    q = DeltaQueue(data["deltas"])
    benchmark.pedantic(
        lambda: node.step(q.next()).consolidate().df.count(),
        rounds=4, iterations=1, warmup_rounds=1,
    )


def test_t8_linear_sum_on_delta(benchmark, data):
    """The linear contrast: global SUM needs only the delta (Thm 3.3)."""
    q = DeltaQueue(data["deltas"])
    benchmark.pedantic(
        lambda: aggregates.agg_sum(q.next(), "l_quantity"),
        rounds=4, iterations=1, warmup_rounds=1,
    )
