"""By-definition stream calculus over finite stream prefixes (§2, §3, §6).

A stream ``S_A = N -> A`` is represented by a finite prefix: a Python list
``[s[0], s[1], ...]``. All DBSP operators are causal, so evaluating a
circuit on a prefix of length ``n`` yields exactly the first ``n`` outputs
of the infinite semantics — the truncation is exact, not approximate.

Everything here is the *specification*: ``lift``, ``delay`` (z⁻¹),
``integrate`` (I), ``differentiate`` (D), and ``incremental`` (Q ↦ Q^Δ =
D∘Q∘I) transcribed literally from the paper. The optimized stateful
operators in :mod:`repro.core.circuit` are tested for stream equality
against these definitions.

Nested streams (§6) are lists of lists (outer index = t₀, inner = t₁),
with rows padded by zeros where lengths differ — finite prefixes of
streams that are zero almost everywhere.
"""
from __future__ import annotations

from typing import Callable, Sequence

from .backend import GroupOps

Stream = list  # Stream[A] ~ list of group values
NestedStream = list  # list of Stream


# --------------------------------------------------------------------- #
# flat streams
# --------------------------------------------------------------------- #
def lift(f: Callable) -> Callable:
    """Definition 2.3: ``(↑f)(s)[t] = f(s[t])`` (n-ary, zips inputs)."""

    def lifted(*streams: Stream) -> Stream:
        return [f(*vals) for vals in zip(*streams)]

    return lifted


def delay(ops: GroupOps, s: Stream) -> Stream:
    """Definition 2.5: ``z⁻¹`` — prepend zero, drop the last element."""
    if not s:
        return []
    return [ops.zero_like(s[0])] + list(s[:-1])


def integrate(ops: GroupOps, s: Stream) -> Stream:
    """Definition 2.19 / Prop. 2.20: ``I(s)[t] = Σ_{i≤t} s[i]``."""
    out: Stream = []
    acc = None
    for v in s:
        acc = v if acc is None else ops.add(acc, v)
        acc = ops.consolidate(acc)
        out.append(acc)
    return out


def differentiate(ops: GroupOps, s: Stream) -> Stream:
    """Definition 2.17: ``D(s)[t] = s[t] - s[t-1]`` (s[-1] = 0)."""
    out: Stream = []
    prev = None
    for v in s:
        d = v if prev is None else ops.sub(v, prev)
        out.append(ops.consolidate(d))
        prev = v
    return out


def incremental(ops: GroupOps, op: Callable[..., Stream]) -> Callable[..., Stream]:
    """Definition 3.1: ``Q^Δ = D ∘ Q ∘ I`` (I applied to each input)."""

    def inc(*streams: Stream) -> Stream:
        return differentiate(ops, op(*(integrate(ops, s) for s in streams)))

    return inc


def stream_equal(ops: GroupOps, a: Stream, b: Stream) -> bool:
    """Pointwise group equality of two equal-length stream prefixes."""
    if len(a) != len(b):
        return False
    return all(ops.equals(x, y) for x, y in zip(a, b))


# --------------------------------------------------------------------- #
# nested streams (§6, appendix A.1)
# --------------------------------------------------------------------- #
def _row_zero(ops: GroupOps, rows: Sequence[Stream]):
    """A zero element derived from any value present in ``rows``."""
    for r in rows:
        for v in r:
            return ops.zero_like(v)
    raise ValueError("cannot derive zero from all-empty nested stream")


def pad_rows(ops: GroupOps, a: Stream, b: Stream, zero) -> tuple[Stream, Stream]:
    """Pad two inner rows to a common length with zeros (zero-a.e. tails)."""
    n = max(len(a), len(b))
    return (
        list(a) + [zero] * (n - len(a)),
        list(b) + [zero] * (n - len(b)),
    )


def row_add(ops: GroupOps, a: Stream, b: Stream, zero) -> Stream:
    """Addition in the group ``S_A`` (pointwise, zero-padded)."""
    pa, pb = pad_rows(ops, a, b, zero)
    return [ops.consolidate(ops.add(x, y)) for x, y in zip(pa, pb)]


def row_sub(ops: GroupOps, a: Stream, b: Stream, zero) -> Stream:
    pa, pb = pad_rows(ops, a, b, zero)
    return [ops.consolidate(ops.sub(x, y)) for x, y in zip(pa, pb)]


def nested_lift(stream_op: Callable[..., Stream]) -> Callable[..., NestedStream]:
    """§6: lifting a stream operator applies it to every row (outer time)."""

    def lifted(*nested: NestedStream) -> NestedStream:
        return [stream_op(*rows) for rows in zip(*nested)]

    return lifted


def nested_integrate_outer(ops: GroupOps, s: NestedStream) -> NestedStream:
    """``I`` on S_{S_A}: running sums of rows (rows are single group values)."""
    zero = _row_zero(ops, s)
    out: NestedStream = []
    acc: Stream = []
    for row in s:
        acc = row_add(ops, acc, row, zero)
        out.append(acc)
    return out


def nested_differentiate_outer(ops: GroupOps, s: NestedStream) -> NestedStream:
    """``D`` on S_{S_A}: row[t] - row[t-1] (zero-padded)."""
    zero = _row_zero(ops, s)
    out: NestedStream = []
    prev: Stream = []
    for row in s:
        out.append(row_sub(ops, row, prev, zero))
        prev = row
    return out


def nested_incremental(
    ops: GroupOps, op: Callable[..., NestedStream]
) -> Callable[..., NestedStream]:
    """Outer-time incrementalization of a nested-stream operator.

    ``(op)^Δ = D_outer ∘ op ∘ I_outer`` — the by-definition form used as
    the oracle for the optimized nested operators (§6.1 / Figure 2).
    """

    def inc(*nested: NestedStream) -> NestedStream:
        return nested_differentiate_outer(
            ops, op(*(nested_integrate_outer(ops, s) for s in nested))
        )

    return inc


def nested_equal(ops: GroupOps, a: NestedStream, b: NestedStream) -> bool:
    """Equality of nested prefixes, treating missing tails as zeros."""
    n = max(len(a), len(b))
    zero = _row_zero(ops, list(a) + list(b))
    for i in range(n):
        ra = a[i] if i < len(a) else []
        rb = b[i] if i < len(b) else []
        pa, pb = pad_rows(ops, ra, rb, zero)
        if not all(ops.equals(x, y) for x, y in zip(pa, pb)):
            return False
    return True
