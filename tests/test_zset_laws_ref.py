"""Z-set algebra laws (§4.1–§4.2) on the reference backend."""
import pytest

from repro.zset import ref

from helpers import make_rng, rand_set2, rand_zset1, rand_zset2, ref_join_ac

SEEDS = list(range(25))


@pytest.mark.parametrize("seed", SEEDS)
def test_group_laws(seed):
    """(Z[A], +, 0, -) is an abelian group."""
    rnd = make_rng(seed)
    a, b, c = rand_zset1(rnd), rand_zset1(rnd), rand_zset1(rnd)
    assert ref.radd(a, b) == ref.radd(b, a)
    assert ref.radd(ref.radd(a, b), c) == ref.radd(a, ref.radd(b, c))
    assert ref.radd(a, {}) == a
    assert ref.radd(a, ref.rneg(a)) == {}


@pytest.mark.parametrize("seed", SEEDS)
def test_distinct_removes_negatives(seed):
    """Definition 4.3: distinct keeps positive rows at weight one."""
    rnd = make_rng(seed)
    a = rand_zset1(rnd)
    d = ref.rdistinct(a)
    assert ref.risset(d)
    assert set(d) == {r for r, w in a.items() if w > 0}


def test_paper_running_example():
    """§4.1's R = {joe→1, anne→-1}: isset, ispositive, distinct, G_p, count."""
    r = {("joe",): 1, ("anne",): -1}
    assert not ref.risset(r)
    assert not ref.rispositive(r)
    assert ref.rdistinct(r) == {("joe",): 1}
    grouped: dict = {}
    for row, w in r.items():
        grouped.setdefault(row[0][0], {})[row] = w
    assert grouped == {"j": {("joe",): 1}, "a": {("anne",): -1}}
    # §7.4: GROUP-BY count over G_p(R) = {(j,1)→1, (a,-1)→1}
    counted = {(k, ref.rcount(g)): 1 for k, g in grouped.items()}
    assert counted == {("j", 1): 1, ("a", -1): 1}


@pytest.mark.parametrize("seed", SEEDS)
def test_isset_implies_ispositive(seed):
    rnd = make_rng(seed)
    s = rand_set2(rnd)
    assert ref.risset(s) and ref.rispositive(s)


@pytest.mark.parametrize("seed", SEEDS)
def test_join_bilinear(seed):
    """⋈ distributes over + in each argument (Definition 2.15)."""
    rnd = make_rng(seed)
    a, b, c = rand_zset2(rnd), rand_zset2(rnd), rand_zset2(rnd)
    assert ref_join_ac(ref.radd(a, b), c) == ref.radd(ref_join_ac(a, c), ref_join_ac(b, c))
    assert ref_join_ac(a, ref.radd(b, c)) == ref.radd(ref_join_ac(a, b), ref_join_ac(a, c))


@pytest.mark.parametrize("seed", SEEDS)
def test_cartesian_bilinear(seed):
    rnd = make_rng(seed)
    a, b, c = rand_zset1(rnd), rand_zset1(rnd), rand_zset1(rnd)
    assert ref.rcartesian(ref.radd(a, b), c) == ref.radd(
        ref.rcartesian(a, c), ref.rcartesian(b, c)
    )


@pytest.mark.parametrize("seed", SEEDS)
def test_map_filter_linear(seed):
    """σ and π are group homomorphisms (the basis of Theorem 3.3)."""
    rnd = make_rng(seed)
    a, b = rand_zset1(rnd), rand_zset1(rnd)
    f = lambda z: ref.rfilter(z, lambda r: r[0] % 2 == 0)  # noqa: E731
    p = lambda z: ref.rmap(z, lambda r: (r[0] % 3,))  # noqa: E731
    assert f(ref.radd(a, b)) == ref.radd(f(a), f(b))
    assert p(ref.radd(a, b)) == ref.radd(p(a), p(b))


@pytest.mark.parametrize("seed", SEEDS)
def test_prop_4_5_distinct_commutes(seed):
    """Prop 4.5: Q(distinct(i)) = distinct(Q(i)) for positive i, Q ∈ {σ,⋈,×}."""
    rnd = make_rng(seed)
    # positive bag input (the proposition requires ispositive, not isset)
    i = {r: abs(w) for r, w in rand_zset2(rnd, max_w=2).items()}
    other = rand_set2(rnd)
    f = lambda z: ref.rfilter(z, lambda r: r[0] > 1)  # noqa: E731
    assert f(ref.rdistinct(i)) == ref.rdistinct(f(i))
    # the *pure* join keeps all columns — projection-fused joins are outside
    # Prop 4.5 (they can collapse distinct matches into one row)
    pure_join = lambda a, b: ref.rjoin(  # noqa: E731
        a, b, key_a=lambda r: r[1], key_b=lambda r: r[0], out=lambda ra, rb: ra + rb
    )
    assert pure_join(ref.rdistinct(i), other) == ref.rdistinct(pure_join(i, other))
    assert ref.rcartesian(ref.rdistinct(i), other) == ref.rdistinct(
        ref.rcartesian(i, other)
    )


@pytest.mark.parametrize("seed", SEEDS)
def test_prop_4_6_distinct_consolidation(seed):
    """Prop 4.6: distinct(Q(distinct(i))) = distinct(Q(i)) for positive i."""
    rnd = make_rng(seed)
    # positive (bag) input: multiplicities >= 1
    i = {r: abs(w) for r, w in rand_zset2(rnd, max_w=2).items()}
    other = rand_set2(rnd)
    cases = [
        lambda z: ref.rfilter(z, lambda r: r[0] > 1),
        lambda z: ref.rmap(z, lambda r: (r[0] % 2, r[1])),
        lambda z: ref.radd(z, other),
        lambda z: ref_join_ac(z, other),
        lambda z: ref.rcartesian(z, other),
    ]
    for q in cases:
        assert ref.rdistinct(q(ref.rdistinct(i))) == ref.rdistinct(q(i))


@pytest.mark.parametrize("seed", SEEDS)
def test_prop_4_7_h_function(seed):
    """Prop 4.7: H computes the change of distinct under a change.

    ``H(i, d) = distinct(i + d) - distinct(i)`` whenever the multiplicity
    transitions are sign flips — verified directly against the definition.
    """
    rnd = make_rng(seed)
    i, d = rand_zset1(rnd), rand_zset1(rnd)
    expect = ref.rsub(ref.rdistinct(ref.radd(i, d)), ref.rdistinct(i))
    assert ref.rh(i, d) == expect
    # support bound: the O(|d|) work claim
    assert set(ref.rh(i, d)) <= set(d)


@pytest.mark.parametrize("seed", SEEDS)
def test_table1_set_ops_vs_python_sets(seed):
    """Table 1 on set inputs reproduces Python set semantics."""
    rnd = make_rng(seed)
    a, b = rand_set2(rnd), rand_set2(rnd)
    sa, sb = set(a), set(b)
    assert set(ref.runion(a, b)) == sa | sb and ref.risset(ref.runion(a, b))
    assert set(ref.rdifference(a, b)) == sa - sb
    assert set(ref.rintersect(a, b)) == sa & sb


@pytest.mark.parametrize("seed", SEEDS)
def test_aggregates_linear(seed):
    """§7.2: a_COUNT and a_SUM are linear maps into Z / R."""
    rnd = make_rng(seed)
    a, b = rand_zset1(rnd), rand_zset1(rnd)
    assert ref.rcount(ref.radd(a, b)) == ref.rcount(a) + ref.rcount(b)
    assert ref.rsum(ref.radd(a, b)) == ref.rsum(a) + ref.rsum(b)


@pytest.mark.parametrize("seed", SEEDS)
def test_min_not_linear_witness(seed):
    """§7.2: MIN needs the full set — deletions can expose a new minimum."""
    rnd = make_rng(seed)
    base = {(1,): 1, (2,): 1, (rnd.randint(3, 9),): 1}
    assert ref.rmin(base) == 1
    after = ref.radd(base, {(1,): -1})  # delete the current minimum
    assert ref.rmin(after) == 2  # only computable from the full set
