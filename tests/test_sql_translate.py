"""Table 1 translation structure + Algorithm 4.8 step 2 (no Spark needed)."""
from repro.sql import translate as t


def paper_44_query() -> t.Node:
    """The §4.4 example: SELECT DISTINCT t1.x, t2.y FROM t1 JOIN t2 ... ."""
    return t.t_project(
        t.t_join(
            t.t_project(t.t_select(t.Rel("t1"), "a > 2"), {"x": "x", "idl": "id"}),
            t.t_project(t.t_select(t.Rel("t2"), "s > 5"), {"y": "y", "idr": "id"}),
            on=[("idl", "idr")],
        ),
        {"x": "x", "y": "y"},
    )


def test_table1_inserts_distincts_where_paper_does():
    assert isinstance(t.t_project(t.Rel("r"), {"a": "a"}), t.Distinct)
    assert isinstance(t.t_union(t.Rel("a"), t.Rel("b")), t.Distinct)
    assert isinstance(t.t_difference(t.Rel("a"), t.Rel("b")), t.Distinct)
    assert isinstance(t.t_select(t.Rel("r"), "a>0"), t.Select)  # σ: no distinct
    assert isinstance(t.t_join(t.Rel("a"), t.Rel("b"), ["k"]), t.Join)
    assert isinstance(t.t_union_all(t.Rel("a"), t.Rel("b")), t.UnionAll)


def test_paper_44_consolidation_three_to_one():
    """§4.4 worked example: 3 distincts consolidate to exactly 1 (at the end)."""
    q = paper_44_query()
    assert t.count_distincts(q) == 3
    qc = t.consolidate_distincts(q)
    assert t.count_distincts(qc) == 1
    assert isinstance(qc, t.Distinct)  # the surviving one caps the circuit


def test_consolidation_idempotent():
    q = t.consolidate_distincts(paper_44_query())
    assert t.consolidate_distincts(q) == q


def test_difference_blocks_consolidation():
    """Negate is outside Prop 4.6: distincts under a difference survive."""
    inner = t.t_project(t.Rel("b"), {"a": "a"})  # Distinct(Project(b))
    q = t.t_difference(t.Rel("a"), inner)
    qc = t.consolidate_distincts(q)
    # outer distinct kept; inner distinct under Negate must also be kept
    assert t.count_distincts(qc) == 2


def test_union_chain_consolidates():
    """distinct(distinct(a+b) + c) -> distinct(a+b+c)."""
    q = t.t_union(t.t_union(t.Rel("a"), t.Rel("b")), t.Rel("c"))
    qc = t.consolidate_distincts(q)
    assert t.count_distincts(qc) == 1


def test_is_positive():
    assert t.is_positive(t.Rel("a"))
    assert not t.is_positive(t.Negate(t.Rel("a")))
    assert t.is_positive(t.Distinct(t.Negate(t.Rel("a"))))
    assert not t.is_positive(t.UnionAll(t.Rel("a"), t.Negate(t.Rel("b"))))
    assert t.is_positive(t.t_join(t.Rel("a"), t.Rel("b"), ["k"]))


def test_consolidation_respects_positivity():
    """A distinct whose input may be negative is never dropped."""
    neg_branch = t.Distinct(t.UnionAll(t.Rel("a"), t.Negate(t.Rel("b"))))
    q = t.Distinct(t.Project.of(neg_branch, {"x": "x"}))
    qc = t.consolidate_distincts(q)
    assert t.count_distincts(qc) == 2  # inner one survives: input not positive
