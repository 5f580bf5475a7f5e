"""Stateful circuit nodes vs by-definition stream semantics (ref backend).

Every optimized operator in :mod:`repro.core.circuit` must produce, step
by step, exactly the stream its defining equation produces.
"""
import pytest

from repro.core import stream as st
from repro.core.backend import RefZSetOps
from repro.core.circuit import (
    BruteIncremental,
    Delay,
    Differentiate,
    IncrementalDistinct,
    IncrementalJoin,
    Integrate,
)
from repro.zset import ref

from helpers import make_rng, rand_zset1, rand_zset2, ref_join_ac

OPS = RefZSetOps()
SEEDS = list(range(20))


def run_node(node, *streams):
    return [node.step(*vals) for vals in zip(*streams)]


@pytest.mark.parametrize("seed", SEEDS)
def test_delay_node(seed):
    rnd = make_rng(seed)
    s = [rand_zset1(rnd) for _ in range(rnd.randint(1, 8))]
    assert run_node(Delay(OPS), s) == st.delay(OPS, s)


@pytest.mark.parametrize("seed", SEEDS)
def test_integrate_node(seed):
    rnd = make_rng(seed)
    s = [rand_zset1(rnd) for _ in range(rnd.randint(1, 8))]
    assert run_node(Integrate(OPS), s) == st.integrate(OPS, s)


@pytest.mark.parametrize("seed", SEEDS)
def test_differentiate_node(seed):
    rnd = make_rng(seed)
    s = [rand_zset1(rnd) for _ in range(rnd.randint(1, 8))]
    assert run_node(Differentiate(OPS), s) == st.differentiate(OPS, s)


@pytest.mark.parametrize("seed", SEEDS)
def test_integrate_then_differentiate_nodes(seed):
    """Theorem 2.22 executed by the stateful nodes."""
    rnd = make_rng(seed)
    s = [rand_zset1(rnd) for _ in range(rnd.randint(1, 8))]
    i, d = Integrate(OPS), Differentiate(OPS)
    assert [d.step(i.step(x)) for x in s] == s


@pytest.mark.parametrize("seed", SEEDS)
def test_incremental_join_node_vs_definition(seed):
    """IncrementalJoin == D ∘ ↑⋈ ∘ (I, I) on random change streams."""
    rnd = make_rng(seed)
    n = rnd.randint(1, 8)
    a = [rand_zset2(rnd) for _ in range(n)]
    b = [rand_zset2(rnd) for _ in range(n)]
    spec = st.incremental(OPS, st.lift(ref_join_ac))(a, b)
    got = run_node(IncrementalJoin(OPS, ref_join_ac), a, b)
    assert st.stream_equal(OPS, got, spec)


@pytest.mark.parametrize("seed", SEEDS)
def test_incremental_distinct_node_vs_definition(seed):
    """IncrementalDistinct == D ∘ ↑distinct ∘ I."""
    rnd = make_rng(seed)
    s = [rand_zset1(rnd) for _ in range(rnd.randint(1, 8))]
    spec = st.incremental(OPS, st.lift(ref.rdistinct))(s)
    got = run_node(IncrementalDistinct(OPS), s)
    assert st.stream_equal(OPS, got, spec)


@pytest.mark.parametrize("seed", SEEDS)
def test_brute_incremental_is_definition(seed):
    """BruteIncremental is the literal Definition 3.1 (here: for distinct)."""
    rnd = make_rng(seed)
    s = [rand_zset1(rnd) for _ in range(rnd.randint(1, 8))]
    spec = st.incremental(OPS, st.lift(ref.rdistinct))(s)
    got = run_node(BruteIncremental(OPS, ref.rdistinct), s)
    assert st.stream_equal(OPS, got, spec)


@pytest.mark.parametrize("seed", SEEDS)
def test_incremental_of_linear_is_identity_nodewise(seed):
    """Theorem 3.3 at node level: brute-incrementalized σ equals σ."""
    rnd = make_rng(seed)
    s = [rand_zset1(rnd) for _ in range(rnd.randint(1, 8))]
    f = lambda z: ref.rfilter(z, lambda r: r[0] % 2 == 0)  # noqa: E731
    got = run_node(BruteIncremental(OPS, f), s)
    assert st.stream_equal(OPS, got, [f(x) for x in s])


@pytest.mark.parametrize("seed", SEEDS)
def test_join_state_is_integral(seed):
    """The join's stored state equals the input integrals (space claim)."""
    rnd = make_rng(seed)
    n = rnd.randint(1, 6)
    a = [rand_zset2(rnd) for _ in range(n)]
    b = [rand_zset2(rnd) for _ in range(n)]
    node = IncrementalJoin(OPS, ref_join_ac)
    run_node(node, a, b)
    ia = st.integrate(OPS, a)[-1]
    ib = st.integrate(OPS, b)[-1]
    assert node.state_sizes() == (len(ia), len(ib))
