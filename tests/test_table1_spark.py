"""T1 — Table 1 correctness: every SQL operator translation vs DuckDB.

Inputs are TPC-H-lite relations turned into *sets* (distinct Z-sets with
weight 1), matching Table 1's set-in/set-out contract; every translated
circuit's output is compared row-for-row against the same SQL in DuckDB.
"""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.sql import translate as t
from repro.sql.compile import evaluate
from repro.zset.frame import ZSet

SF = 0.0005  # ~3000 lineitem rows: enough to exercise shuffles, fast


@pytest.fixture(scope="module")
def rels(spark):
    li = ZSet.from_df(
        synth_data.lineitem(spark, sf=SF).select(
            "l_orderkey", "l_partkey", "l_quantity", "l_returnflag"
        )
    ).distinct().materialize()
    orders = ZSet.from_df(
        synth_data.orders(spark, sf=SF).select(
            "o_orderkey", "o_custkey", "o_totalprice", "o_orderstatus"
        )
    ).distinct().materialize()
    return {
        "lineitem": li,
        "orders": orders,
        "li_pdf": li.to_set_df().toPandas(),
        "o_pdf": orders.to_set_df().toPandas(),
    }


def run(ast, rels):
    inputs = {"lineitem": rels["lineitem"], "orders": rels["orders"]}
    return evaluate(t.consolidate_distincts(ast), inputs)


def test_select(spark, rels):
    """Table 1 row σ: SELECT * FROM I WHERE p."""
    out = run(t.t_select(t.Rel("lineitem"), "l_quantity > 25"), rels)
    assert out.isset()
    assert_equivalent(
        out.to_set_df(),
        "SELECT * FROM li WHERE l_quantity > 25",
        li=rels["li_pdf"],
    )


def test_project(spark, rels):
    """Table 1 row π: SELECT DISTINCT cols FROM I (needs distinct)."""
    out = run(
        t.t_project(t.Rel("lineitem"), {"k": "l_orderkey", "f": "l_returnflag"}),
        rels,
    )
    assert out.isset()
    assert_equivalent(
        out.to_set_df(),
        "SELECT DISTINCT l_orderkey AS k, l_returnflag AS f FROM li",
        li=rels["li_pdf"],
    )


def test_map_expression(spark, rels):
    """Table 1 row map: computed columns."""
    out = run(
        t.t_project(
            t.Rel("orders"), {"k": "o_orderkey", "bucket": "o_totalprice > 250000"}
        ),
        rels,
    )
    assert_equivalent(
        out.to_set_df(),
        "SELECT DISTINCT o_orderkey AS k, o_totalprice > 250000 AS bucket FROM o",
        o=rels["o_pdf"],
    )


def test_join(spark, rels):
    """Table 1 row ⋈: equijoin of two sets is a set without distinct."""
    ast = t.t_project(
        t.t_join(t.Rel("orders"), t.Rel("lineitem"), [("o_orderkey", "l_orderkey")]),
        {"k": "o_orderkey", "c": "o_custkey", "p": "l_partkey"},
    )
    out = run(ast, rels)
    assert out.isset()
    assert_equivalent(
        out.to_set_df(),
        "SELECT DISTINCT o_orderkey AS k, o_custkey AS c, l_partkey AS p "
        "FROM o JOIN li ON o_orderkey = l_orderkey",
        o=rels["o_pdf"], li=rels["li_pdf"],
    )


def test_pure_join_is_set(spark, rels):
    """Set ⋈ set (no projection) keeps every weight at exactly 1."""
    ast = t.t_join(t.Rel("orders"), t.Rel("lineitem"), [("o_orderkey", "l_orderkey")])
    assert run(ast, rels).isset()


def test_cartesian(spark, rels):
    """Table 1 row ×."""
    small1 = t.t_project(t.t_select(t.Rel("orders"), "o_orderkey <= 5"), {"k1": "o_orderkey"})
    small2 = t.t_project(t.t_select(t.Rel("lineitem"), "l_partkey <= 3"), {"k2": "l_partkey"})
    out = run(t.t_cartesian(small1, small2), rels)
    assert out.isset()
    assert_equivalent(
        out.to_set_df(),
        "SELECT * FROM (SELECT DISTINCT o_orderkey AS k1 FROM o WHERE o_orderkey <= 5), "
        "(SELECT DISTINCT l_partkey AS k2 FROM li WHERE l_partkey <= 3)",
        o=rels["o_pdf"], li=rels["li_pdf"],
    )


def _two_key_sets(rels):
    a = t.t_project(t.Rel("orders"), {"k": "o_custkey"})
    b = t.t_project(t.Rel("lineitem"), {"k": "l_partkey"})
    return a, b


def test_union(spark, rels):
    a, b = _two_key_sets(rels)
    out = run(t.t_union(a, b), rels)
    assert out.isset()
    assert_equivalent(
        out.to_set_df(),
        "SELECT o_custkey AS k FROM o UNION SELECT l_partkey AS k FROM li",
        o=rels["o_pdf"], li=rels["li_pdf"],
    )


def test_difference(spark, rels):
    a, b = _two_key_sets(rels)
    out = run(t.t_difference(a, b), rels)
    assert out.isset()
    assert_equivalent(
        out.to_set_df(),
        "SELECT DISTINCT o_custkey AS k FROM o EXCEPT SELECT DISTINCT l_partkey AS k FROM li",
        o=rels["o_pdf"], li=rels["li_pdf"],
    )


def test_intersect(spark, rels):
    a, b = _two_key_sets(rels)
    out = run(t.Distinct(t.t_intersect(a, b, ["k"])), rels)
    assert out.isset()
    assert_equivalent(
        out.to_set_df(),
        "SELECT DISTINCT o_custkey AS k FROM o INTERSECT SELECT DISTINCT l_partkey AS k FROM li",
        o=rels["o_pdf"], li=rels["li_pdf"],
    )


def test_union_all_bag(spark, rels):
    """§7.1: UNION ALL == Z-set addition, checked with bag expansion."""
    a = t.Project.of(t.Rel("orders"), {"k": "o_custkey % 10"})
    b = t.Project.of(t.Rel("lineitem"), {"k": "l_partkey % 10"})
    out = evaluate(t.t_union_all(a, b), {"orders": rels["orders"], "lineitem": rels["lineitem"]})
    assert_equivalent(
        out.to_bag_df(),
        "SELECT o_custkey % 10 AS k FROM o UNION ALL SELECT l_partkey % 10 AS k FROM li",
        o=rels["o_pdf"], li=rels["li_pdf"],
    )


def test_consolidated_plan_same_result(spark, rels):
    """Algorithm 4.8 step 2 never changes results, only the plan."""
    ast = t.t_project(
        t.t_join(
            t.t_project(t.Rel("orders"), {"k": "o_orderkey", "c": "o_custkey"}),
            t.t_project(t.Rel("lineitem"), {"k2": "l_orderkey", "p": "l_partkey"}),
            [("k", "k2")],
        ),
        {"c": "c", "p": "p"},
    )
    inputs = {"orders": rels["orders"], "lineitem": rels["lineitem"]}
    raw = evaluate(ast, inputs)
    opt = evaluate(t.consolidate_distincts(ast), inputs)
    assert raw.equals(opt)
    assert t.count_distincts(t.consolidate_distincts(ast)) < t.count_distincts(ast)
