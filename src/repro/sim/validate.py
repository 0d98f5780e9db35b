"""Trace legality: does a transfer trace respect a complexity level?

The validator enforces the complexity ladder documented in
:mod:`repro.sim.transfers` (and DESIGN.md). It is the executable form
of the Tydi contract the paper's IR codifies: "a lower complexity
imposes more restrictions on a source, which conversely results in a
higher complexity making it more difficult to implement a sink"
(Section 4.1). A sink implemented for complexity C must accept every
trace this validator passes at C; the deserializer is such a sink.
"""
from __future__ import annotations

from typing import Optional

from .transfers import Trace, Transfer


class TraceError(ValueError):
    """Raised when a trace violates the rules of its complexity level."""


def validate_trace(
    trace: Trace,
    *,
    lanes: int,
    dimensionality: int = 0,
    complexity: int = 1,
) -> None:
    """Raise :class:`TraceError` if ``trace`` is illegal for a physical
    stream with the given lanes/dimensionality/complexity."""
    n, d, c = lanes, dimensionality, complexity
    open_seq = False  # inside an innermost sequence (elements pending)
    started = False

    transfers = [t for t in trace if t is not None]
    last_transfer = transfers[-1] if transfers else None

    for i, t in enumerate(trace):
        if t is None:
            if c < 3 and open_seq:
                raise TraceError(
                    f"cycle {i}: valid deasserted mid-innermost-sequence requires C>=3 (C={c})"
                )
            continue
        started = True
        _check_shape(t, i, n, d, c)
        active = t.active_lanes()

        # Active lanes must carry values; inactive must not.
        for li in range(t.n):
            if li in active and t.lanes[li] is None:
                raise TraceError(f"cycle {i}: active lane {li} carries no element")

        if c < 7:
            # Strobe bits must form the contiguous range [stai, endi]
            # (all-equal per the spec's low-complexity guarantee), or be
            # all zero for an empty transfer.
            if any(t.strb):
                expect = [t.stai <= li <= t.endi for li in range(t.n)]
                if list(t.strb) != expect:
                    raise TraceError(
                        f"cycle {i}: non-contiguous strobe requires C>=7 (C={c})"
                    )
        if c < 6 and t.stai != 0:
            raise TraceError(f"cycle {i}: nonzero start index requires C>=6 (C={c})")

        closes_inner = _closes_inner(t, d)
        empty = len(active) == 0

        if empty:
            if not _any_last(t, d):
                if c < 5:
                    raise TraceError(
                        f"cycle {i}: padding transfer (no lanes, no last) requires C>=5 (C={c})"
                    )
            elif c < 4:
                raise TraceError(
                    f"cycle {i}: last flags on a transfer without elements "
                    f"(empty sequence / deferred close) require C>=4 (C={c})"
                )
        else:
            is_final = t is last_transfer
            if (
                c < 2
                and len(active) != t.n
                and not closes_inner
                and not (d == 0 and is_final)
            ):
                raise TraceError(
                    f"cycle {i}: non-full transfer mid-innermost-sequence requires C>=2 (C={c})"
                )
            # Elements in a transfer closing an outer dimension must
            # close the inner ones too (they belong to the innermost
            # sequence) — per-transfer last only (C8 lanes are ordered).
            if t.last is not None and any(t.last[1:]) and not t.last[0]:
                raise TraceError(
                    f"cycle {i}: transfer with elements closes an outer dimension "
                    "without closing the innermost"
                )

        if d >= 1:
            if c >= 8:
                # Per-lane last: sequence state tracked per lane.
                for li in range(t.n):
                    if t.strb[li]:
                        open_seq = True
                    if t.lane_last[li][0]:
                        open_seq = False
            else:
                if closes_inner:
                    open_seq = False
                elif active:
                    open_seq = True
        else:
            open_seq = started


def _any_last(t: Transfer, d: int) -> bool:
    if t.lane_last is not None:
        return any(any(bits) for bits in t.lane_last)
    return t.last is not None and any(t.last)


def _closes_inner(t: Transfer, d: int) -> bool:
    if d == 0:
        return False
    if t.lane_last is not None:
        return any(bits[0] for bits in t.lane_last)
    return bool(t.last and t.last[0])


def _check_shape(t: Transfer, i: int, n: int, d: int, c: int) -> None:
    if t.n != n:
        raise TraceError(f"cycle {i}: transfer has {t.n} lanes, stream has {n}")
    if d >= 1:
        if c >= 8:
            if t.lane_last is None:
                raise TraceError(f"cycle {i}: C=8 requires per-lane last")
            if len(t.lane_last) != n or any(len(b) != d for b in t.lane_last):
                raise TraceError(f"cycle {i}: lane_last must be {n} x {d} bits")
        else:
            if t.last is None:
                raise TraceError(f"cycle {i}: D>=1 requires a per-transfer last field")
            if len(t.last) != d:
                raise TraceError(f"cycle {i}: last must be {d} bits, got {len(t.last)}")
    else:
        if _any_last(t, d):
            raise TraceError(f"cycle {i}: last flags on a dimensionality-0 stream")
    if not (0 <= t.stai <= t.endi <= n - 1):
        raise TraceError(f"cycle {i}: invalid index range stai={t.stai} endi={t.endi}")