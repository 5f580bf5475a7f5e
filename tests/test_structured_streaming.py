"""Structured Streaming driver: micro-batches drive a DBSP circuit.

The integrated circuit output must equal the non-incremental query over
the integrated input *regardless of how the engine batches rows* —
change-split invariance (Theorem 2.22).
"""
import json
import os

from repro.sql import translate as t
from repro.sql.compile import IncrementalView, evaluate
from repro.streaming.structured import run_stream
from repro.zset.frame import ZSet


def test_foreachbatch_drives_incremental_view(spark, tmp_path):
    in_dir = tmp_path / "in"
    ckpt = tmp_path / "ckpt"
    in_dir.mkdir()
    rows = [{"id": i, "a": i % 6, "x": i % 4} for i in range(30)]
    for fno in range(3):
        with open(in_dir / f"batch{fno}.json", "w") as f:
            for r in rows[fno * 10: (fno + 1) * 10]:
                f.write(json.dumps(r) + "\n")

    ast = t.t_project(t.t_select(t.Rel("t1"), "a > 2"), {"x": "x"})
    iv = IncrementalView(ast)
    outputs = []

    def on_change(delta: ZSet, batch_id: int) -> None:
        outputs.append(iv.step({"t1": delta}).materialize())

    stream_df = (
        spark.readStream.schema("id long, a long, x long")
        .option("maxFilesPerTrigger", 1)
        .json(str(in_dir))
    )
    run_stream(stream_df, on_change, str(ckpt))

    assert len(outputs) >= 1  # engine chose some batching; any split is fine
    acc = outputs[0]
    for o in outputs[1:]:
        acc = acc.add(o)
    full_in = ZSet.from_rows(
        spark, [(r["id"], r["a"], r["x"], 1) for r in rows], "id long, a long, x long"
    )
    want = evaluate(iv.ast, {"t1": full_in})
    assert acc.equals(want)


def test_weighted_stream_deletions(spark, tmp_path):
    """A source that ships a __w column can stream deletions."""
    in_dir = tmp_path / "in"
    in_dir.mkdir()
    batches = [
        [{"k": 1, "__w": 1}, {"k": 2, "__w": 1}],
        [{"k": 1, "__w": -1}, {"k": 3, "__w": 1}],
    ]
    for fno, batch in enumerate(batches):
        with open(in_dir / f"b{fno}.json", "w") as f:
            for r in batch:
                f.write(json.dumps(r) + "\n")

    ast = t.Distinct(t.Project.of(t.Rel("t1"), {"k": "k"}))
    iv = IncrementalView(ast)
    acc = []

    def on_change(delta: ZSet, batch_id: int) -> None:
        acc.append(iv.step({"t1": delta}).materialize())

    stream_df = (
        spark.readStream.schema("k long, __w long")
        .option("maxFilesPerTrigger", 1)
        .json(str(in_dir))
    )
    run_stream(stream_df, on_change, str(tmp_path / "ckpt"))
    total = acc[0]
    for o in acc[1:]:
        total = total.add(o)
    got = total.consolidate().collect_dict()
    assert got == {(2,): 1, (3,): 1}
