"""Nested-stream operators (§6) vs by-definition semantics (ref backend)."""
import pytest

from repro.core import stream as st
from repro.core.backend import RefZSetOps
from repro.core.nested import (
    IncrementalRecursive,
    NestedIncrementalDistinct,
    NestedIncrementalJoin,
)
from repro.core.recursion import naive_fixpoint
from repro.zset import ref

from helpers import make_rng, rand_zset1, rand_zset2, ref_join_ac

OPS = RefZSetOps()
SEEDS = list(range(30))


def rand_nested(rnd, mk, t_max=4, i_max=4):
    t, i = rnd.randint(1, t_max), rnd.randint(1, i_max)
    return [[mk(rnd) for _ in range(i)] for _ in range(t)]


def run_nested_join(a, b):
    node = NestedIncrementalJoin(OPS, ref_join_ac)
    out = []
    for t in range(len(a)):
        node.begin_outer()
        out.append([node.inner_step(a[t][i], b[t][i]) for i in range(len(a[t]))])
        node.end_outer()
    return out


@pytest.mark.parametrize("seed", SEEDS)
def test_nested_join_vs_definition(seed):
    """(↑(↑⋈)^Δ)^Δ: the 4-term circuit equals D∘↑(D∘↑⋈∘I)∘I."""
    rnd = make_rng(seed)
    t, i = rnd.randint(1, 4), rnd.randint(1, 4)
    a = [[rand_zset2(rnd) for _ in range(i)] for _ in range(t)]
    b = [[rand_zset2(rnd) for _ in range(i)] for _ in range(t)]
    inner = st.incremental(OPS, st.lift(ref_join_ac))
    spec = st.nested_incremental(OPS, st.nested_lift(inner))(a, b)
    assert st.nested_equal(OPS, run_nested_join(a, b), spec)


@pytest.mark.parametrize("seed", SEEDS)
def test_nested_join_varying_inner_depth(seed):
    """Outer steps with different inner depths (zero-a.e. tails)."""
    rnd = make_rng(seed)
    t = rnd.randint(2, 4)
    depth = max(rnd.randint(1, 4) for _ in range(t))
    a, b = [], []
    for _ in range(t):
        d = rnd.randint(1, depth)
        a.append([rand_zset2(rnd) for _ in range(d)] + [{}] * (depth - d))
        b.append([rand_zset2(rnd) for _ in range(d)] + [{}] * (depth - d))
    inner = st.incremental(OPS, st.lift(ref_join_ac))
    spec = st.nested_incremental(OPS, st.nested_lift(inner))(a, b)
    assert st.nested_equal(OPS, run_nested_join(a, b), spec)


@pytest.mark.parametrize("seed", SEEDS)
def test_nested_distinct_vs_definition(seed):
    """(↑(↑distinct)^Δ)^Δ equals its defining composition."""
    rnd = make_rng(seed)
    t, i = rnd.randint(1, 4), rnd.randint(1, 5)
    d = [[rand_zset1(rnd) for _ in range(i)] for _ in range(t)]
    inner = st.incremental(OPS, st.lift(ref.rdistinct))
    spec = st.nested_incremental(OPS, st.nested_lift(inner))(d)
    node = NestedIncrementalDistinct(OPS)
    got = []
    for t_ in range(len(d)):
        node.begin_outer()
        got.append([node.inner_step(x) for x in d[t_]])
        node.end_outer()
    assert st.nested_equal(OPS, got, spec)


@pytest.mark.parametrize("seed", SEEDS)
def test_nested_integrate_differentiate_inverse(seed):
    """Outer I and D on nested streams are inverses."""
    rnd = make_rng(seed)
    s = rand_nested(rnd, rand_zset1)
    rt = st.nested_differentiate_outer(OPS, st.nested_integrate_outer(OPS, s))
    assert st.nested_equal(OPS, rt, s)


def test_appendix_a1_examples():
    """The worked integer examples of Appendix A.1 (i[t0][t1] = t0 + 2*t1)."""

    class IntOps(RefZSetOps):
        def add(self, a, b):
            return a + b

        def neg(self, a):
            return -a

        def zero_like(self, x):
            return 0

        def is_zero(self, a):
            return a == 0

    iops = IntOps()
    i = [[t0 + 2 * t1 for t0 in range(4)] for t1 in range(4)]
    # NB: the appendix indexes t0 as the column; our outer index is the row.
    # I on S_{S_A} sums whole rows: [0 1 2 3], then +[2 3 4 5] = [2 4 6 8], ...
    expect_I = [[0, 1, 2, 3], [2, 4, 6, 8], [6, 9, 12, 15], [12, 16, 20, 24]]
    assert st.nested_integrate_outer(iops, i) == expect_I
    expect_D = [[0, 1, 2, 3], [2, 2, 2, 2], [2, 2, 2, 2], [2, 2, 2, 2]]
    assert st.nested_differentiate_outer(iops, i) == expect_D
    lifted_I = st.nested_lift(lambda row: st.integrate(iops, row))(i)
    assert lifted_I == [[0, 1, 3, 6], [2, 5, 9, 14], [4, 9, 15, 22], [6, 13, 21, 30]]
    lifted_D = st.nested_lift(lambda row: st.differentiate(iops, row))(i)
    assert lifted_D == [[0, 1, 1, 1], [2, 1, 1, 1], [4, 1, 1, 1], [6, 1, 1, 1]]


# --------------------------------------------------------------------- #
# full incremental recursive query (Figure 2)
# --------------------------------------------------------------------- #
def tc_fix(edges):
    body = lambda x: ref.rdistinct(ref.radd(edges, ref_join_ac(edges, x)))  # noqa: E731
    fix, _ = naive_fixpoint(OPS, body, {})
    return fix


def make_delta_stream(rnd, n_nodes=6, n_steps=4, churn=4):
    cur: dict = {}
    deltas = []
    for _ in range(n_steps):
        d: dict = {}
        for _ in range(rnd.randint(1, churn)):
            e = (rnd.randint(0, n_nodes), rnd.randint(0, n_nodes))
            live = cur.get(e, 0) + d.get(e, 0) > 0
            if live and rnd.random() < 0.4:
                d[e] = d.get(e, 0) - 1
            elif not live:
                d[e] = d.get(e, 0) + 1
        d = {k: v for k, v in d.items() if v}
        deltas.append(d)
        cur = ref.radd(cur, d)
    return deltas


@pytest.mark.parametrize("seed", SEEDS)
def test_incremental_recursive_tc_inserts_and_deletes(seed):
    """Figure 2: ΔR[t] from the nested circuit == D(lifted TC)(ΔE)."""
    rnd = make_rng(seed)
    node = IncrementalRecursive(OPS, base_fn=dict, join_fn=ref_join_ac)
    e_acc: dict = {}
    r_prev: dict = {}
    for d in make_delta_stream(rnd):
        got = node.step(d)
        e_acc = ref.radd(e_acc, d)
        r_new = tc_fix(e_acc)
        assert got == ref.rsub(r_new, r_prev)
        r_prev = r_new


@pytest.mark.parametrize("seed", SEEDS[:10])
def test_incremental_recursive_integrates_to_set(seed):
    """The integrated output of the nested circuit is always a set."""
    rnd = make_rng(seed)
    node = IncrementalRecursive(OPS, base_fn=dict, join_fn=ref_join_ac)
    acc: dict = {}
    for d in make_delta_stream(rnd, n_steps=5):
        acc = ref.radd(acc, node.step(d))
        assert ref.risset(acc)


def test_incremental_recursive_iteration_bound():
    """§6.2: the incremental circuit converges (path graph, depth ~n)."""
    node = IncrementalRecursive(OPS, base_fn=dict, join_fn=ref_join_ac)
    # insert a path one edge at a time: worst-case deepening
    for i in range(6):
        node.step({(i, i + 1): 1})
    assert max(node.inner_iterations) <= 8
