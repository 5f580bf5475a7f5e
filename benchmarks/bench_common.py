"""Shared benchmark fixtures: TPC-H-lite change streams at bench scale.

Benchmarks contrast, per table of EXPERIMENTS.md, the *incremental* step
(work ∝ change size) with the *full recomputation* step (work ∝ database
size) on identical inputs. ``SF`` and delta sizes are chosen so one full
recompute takes O(seconds) and the asymmetry is visible above Spark's
fixed per-job overhead.
"""
from __future__ import annotations

import numpy as np

from repro import synth_data
from repro.zset.frame import ZSet

SF = 0.1  # ~600k lineitem rows, ~150k orders
DELTA_ROWS = 1_000


def lineitem_state_and_deltas(spark, n_deltas: int = 12, seed: int = 0):
    """A large base lineitem Z-set + a queue of small insert deltas."""
    pdf = synth_data.lineitem(spark, sf=SF, seed=seed).toPandas()
    base_pdf = pdf.iloc[: len(pdf) - n_deltas * DELTA_ROWS]
    base = ZSet.from_df(spark.createDataFrame(base_pdf)).materialize()
    deltas = []
    for i in range(n_deltas):
        lo = len(base_pdf) + i * DELTA_ROWS
        d = pdf.iloc[lo: lo + DELTA_ROWS]
        deltas.append(ZSet.from_df(spark.createDataFrame(d)).materialize())
    return base, deltas


def orders_state_and_deltas(spark, n_deltas: int = 12, seed: int = 1):
    pdf = synth_data.orders(spark, sf=SF, seed=seed).toPandas()
    n_delta_rows = DELTA_ROWS // 4
    base_pdf = pdf.iloc[: len(pdf) - n_deltas * n_delta_rows]
    base = ZSet.from_df(spark.createDataFrame(base_pdf)).materialize()
    deltas = []
    for i in range(n_deltas):
        lo = len(base_pdf) + i * n_delta_rows
        d = pdf.iloc[lo: lo + n_delta_rows]
        deltas.append(ZSet.from_df(spark.createDataFrame(d)).materialize())
    return base, deltas


class DeltaQueue:
    """Hands one pre-materialized delta per benchmark round."""

    def __init__(self, deltas):
        self.deltas = list(deltas)
        self.i = 0

    def next(self) -> ZSet:
        d = self.deltas[self.i % len(self.deltas)]
        self.i += 1
        return d
