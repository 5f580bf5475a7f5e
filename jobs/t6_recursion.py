"""T6 — naïve vs semi-naïve transitive closure: per-iteration facts + time."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from common import get_spark, print_table, timed  # noqa: E402

from repro import synth_data  # noqa: E402
from repro.core.backend import SparkZSetOps  # noqa: E402
from repro.core.recursion import IncBody, naive_fixpoint, semi_naive_fixpoint  # noqa: E402
from repro.core.tc import edges_zset, tc_base_fn, tc_body, tc_join_fn  # noqa: E402
from repro.zset.frame import ZSet  # noqa: E402

SOPS = SparkZSetOps()


def main():
    spark = get_spark("t6_recursion")
    zero = ZSet.empty(spark, "s int, t int")
    rows = []
    profile = None
    for layers, width in ((4, 60), (6, 200), (8, 400)):
        edges = synth_data.layered_dag_edges(layers=layers, width=width, fanout=2, seed=21)
        ze = edges_zset(spark, edges)

        (_, n_stats), t_naive = timed(
            lambda: naive_fixpoint(SOPS, tc_body(ze), zero, collect_stats=True),
            repeats=1,
        )

        def semi():
            body = IncBody(SOPS, base_fn=tc_base_fn, join_fn=tc_join_fn)
            return semi_naive_fixpoint(SOPS, body, ze, collect_stats=True)

        (_, s_stats), t_semi = timed(semi, repeats=1)
        rows.append(
            [f"{layers}x{width}", len(edges), n_stats.iterations,
             n_stats.total_facts, s_stats.total_facts,
             f"{t_naive:.1f} s", f"{t_semi:.1f} s",
             f"{n_stats.total_facts / max(1, s_stats.total_facts):.1f}x"]
        )
        if layers == 8:
            profile = (n_stats, s_stats)
    print_table(
        "T6 — transitive closure: naïve vs semi-naïve (circuit 5.1)",
        ["DAG", "edges", "iters", "naïve facts touched", "semi-naïve facts",
         "naïve time", "semi-naïve time", "work ratio"],
        rows,
    )
    n_stats, s_stats = profile
    print_table(
        "T6b — per-iteration facts on the largest DAG",
        ["iteration", "naïve (candidate size)", "semi-naïve (new facts)"],
        [
            [i, n, s]
            for i, (n, s) in enumerate(
                zip(
                    n_stats.facts_per_iteration,
                    s_stats.facts_per_iteration
                    + [0] * (len(n_stats.facts_per_iteration) - len(s_stats.facts_per_iteration)),
                )
            )
        ],
    )
    spark.stop()


if __name__ == "__main__":
    main()
