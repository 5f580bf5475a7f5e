"""T7 — incremental maintenance of a recursive view (Figure 2) vs recompute."""
import os
import sys
import time

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from common import get_spark, print_table  # noqa: E402

from repro import synth_data  # noqa: E402
from repro.core.backend import SparkZSetOps  # noqa: E402
from repro.core.nested import IncrementalRecursive  # noqa: E402
from repro.core.recursion import IncBody, semi_naive_fixpoint  # noqa: E402
from repro.core.tc import E_SCHEMA, edges_zset, tc_base_fn, tc_join_fn  # noqa: E402
from repro.zset.frame import ZSet  # noqa: E402

SOPS = SparkZSetOps()
N_STEPS = 6


def main():
    spark = get_spark("t7_incr_recursion")
    edges = synth_data.layered_dag_edges(layers=6, width=300, fanout=2, seed=31)
    initial, deltas = synth_data.edge_change_stream(
        edges, n_steps=N_STEPS, inserts_per_step=6, deletes_per_step=2, seed=32
    )
    z_init = edges_zset(spark, initial)
    z_deltas = [
        ZSet.from_rows(spark, list(d), E_SCHEMA).materialize() for d in deltas
    ]

    node = IncrementalRecursive(SOPS, base_fn=tc_base_fn, join_fn=tc_join_fn)
    t0 = time.perf_counter()
    node.step(z_init)
    t_init = time.perf_counter() - t0

    rows = []
    acc = z_init
    for step, zd in enumerate(z_deltas):
        t0 = time.perf_counter()
        out = node.step(zd)
        delta_rows = out.support_count()
        t_inc = time.perf_counter() - t0

        acc = acc.add(zd).materialize()
        t0 = time.perf_counter()
        body = IncBody(SOPS, base_fn=tc_base_fn, join_fn=tc_join_fn)
        full, _ = semi_naive_fixpoint(SOPS, body, acc)
        full.support_count()
        t_full = time.perf_counter() - t0
        rows.append(
            [step + 1, zd.support_count(), delta_rows,
             node.inner_iterations[-1],
             f"{t_inc:.1f} s", f"{t_full:.1f} s", f"{t_full/t_inc:.1f}x"]
        )
    print_table(
        f"T7 — TC under edge churn (init {len(initial)} edges, fixpoint {t_init:.1f} s)",
        ["step", "|ΔE|", "|ΔR| rows", "inner iters",
         "incremental (Fig. 2)", "semi-naïve from scratch", "speedup"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
