"""T7 — §6/Figure 2: maintain a transitive closure vs recompute it.

After loading an initial graph, each step applies a small edge change.
The nested incremental circuit adjusts the previously computed fixpoint;
the baseline reruns semi-naïve evaluation from scratch on the updated
edge set (the best non-incremental alternative — already beats naïve).
"""
import pytest

from repro import synth_data
from repro.core.backend import SparkZSetOps
from repro.core.nested import IncrementalRecursive
from repro.core.recursion import IncBody, semi_naive_fixpoint
from repro.zset.frame import ZSet

from repro.core.tc import tc_base_fn, tc_join_fn

SOPS = SparkZSetOps()
E_SCHEMA = "h int, t int"


@pytest.fixture(scope="module")
def stream(spark):
    edges = synth_data.layered_dag_edges(layers=6, width=25, fanout=2, seed=31)
    initial, deltas = synth_data.edge_change_stream(
        edges, n_steps=8, inserts_per_step=4, deletes_per_step=0, seed=32
    )
    z_init = ZSet.from_rows(spark, [(h, t, 1) for h, t in initial], E_SCHEMA).materialize()
    z_deltas = [
        ZSet.from_rows(spark, list(d), E_SCHEMA).materialize() for d in deltas
    ]
    # accumulated edge snapshots, for the recompute baseline
    snaps = []
    acc = z_init
    for zd in z_deltas:
        acc = acc.add(zd).materialize()
        snaps.append(acc)
    return {"init": z_init, "deltas": z_deltas, "snaps": snaps}


def test_t7_incremental_maintenance_step(benchmark, stream):
    node = IncrementalRecursive(SOPS, base_fn=tc_base_fn, join_fn=tc_join_fn)
    node.step(stream["init"])  # pay the initial fixpoint once
    i = {"v": 0}

    def step():
        d = stream["deltas"][i["v"] % len(stream["deltas"])]
        i["v"] += 1
        return node.step(d)

    benchmark.pedantic(step, rounds=4, iterations=1, warmup_rounds=0)
    benchmark.extra_info["inner_iterations"] = node.inner_iterations


def test_t7_semi_naive_recompute_step(benchmark, stream):
    i = {"v": 0}

    def recompute():
        snap = stream["snaps"][i["v"] % len(stream["snaps"])]
        i["v"] += 1
        body = IncBody(SOPS, base_fn=tc_base_fn, join_fn=tc_join_fn)
        return semi_naive_fixpoint(SOPS, body, snap)

    benchmark.pedantic(recompute, rounds=4, iterations=1, warmup_rounds=0)
