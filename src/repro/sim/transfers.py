"""Serialize/deserialize abstract data to physical-stream transfers.

This simulator executes the contract the Tydi Stream type encodes
(paper Section 4.1, Figure 1): given element lanes ``N``,
dimensionality ``D`` and complexity ``C``, which organisations of
elements over transfers and cycles are legal, and what they mean.

Complexity ladder (as interpreted in DESIGN.md, consistent with the
paper's text and Figure 1 — "at complexity = 1 all elements must be
aligned to the first lane, last data is asserted per transfer, and all
data must be transferred over consecutive cycles and lanes; at
complexity = 8 there are no requirements"):

* C ≥ 2 — the source may break an innermost sequence into non-full
  transfers (the end index terminates a transfer early mid-sequence);
* C ≥ 3 — the source may postpone transfers (assert *valid* low) in the
  middle of an innermost sequence ("a complexity of ≤ 2 requires that
  elements of an inner sequence are transferred over consecutive cycles
  by a source, while higher complexities allow it to stall");
* C ≥ 4 — *last* may be asserted in a transfer with zero active lanes:
  empty sequences, and deferred closing of a sequence whose elements
  were transferred earlier;
* C ≥ 5 — transfers may carry zero active lanes and no *last* flags at
  all (pure padding);
* C ≥ 6 — the start index may be nonzero (misaligned first lane);
* C ≥ 7 — individual strobe bits may be deasserted (holes); start/end
  indices are significant only when all strobe bits are asserted
  (paper Section 8.1 fix #2);
* C = 8 — *last* is asserted per lane and may be postponed, using an
  inactive lane to close a sequence from a previous lane or transfer.

Below C8 every transfer's elements belong to a single innermost
sequence, because *last* is per-transfer.

A *trace* is a list of cycle slots: a :class:`Transfer`, or ``None``
for a cycle in which *valid* is deasserted.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, List, Optional, Sequence, Tuple

import numpy as np

from ..core.physical import indices_significant


@dataclass(frozen=True)
class Transfer:
    """One handshaked transfer on a physical stream.

    ``lanes`` has length N; inactive lanes hold ``None``. ``strb``
    mirrors lane activity (the serializer keeps them consistent; the
    validator checks). ``last`` is a tuple of D bools per transfer for
    C < 8; ``lane_last`` is an N-tuple of D-tuples for C = 8 (exactly
    one of the two is set when D >= 1).
    """

    lanes: Tuple[Any, ...]
    strb: Tuple[bool, ...]
    stai: int = 0
    endi: int = -1  # -1 means N-1 (set in __post_init__)
    last: Optional[Tuple[bool, ...]] = None
    lane_last: Optional[Tuple[Tuple[bool, ...], ...]] = None
    user: Any = None

    def __post_init__(self) -> None:
        if self.endi == -1:
            object.__setattr__(self, "endi", len(self.lanes) - 1)
        if len(self.strb) != len(self.lanes):
            raise ValueError("strb width must equal lane count")
        if self.last is not None and self.lane_last is not None:
            raise ValueError("last is either per-transfer or per-lane, not both")

    @property
    def n(self) -> int:
        return len(self.lanes)

    def active_lanes(self) -> List[int]:
        """Indices of the lanes carrying data, honouring fix #2: when
        all strobe bits are asserted the start/end indices select the
        active range; otherwise the strobe alone is significant."""
        if indices_significant(self.strb):
            return list(range(self.stai, self.endi + 1))
        return [i for i, s in enumerate(self.strb) if s]

    def active_values(self) -> List[Any]:
        return [self.lanes[i] for i in self.active_lanes()]


Trace = List[Optional[Transfer]]


def _flatten(data: Any, dim: int) -> List[Tuple[Any, Tuple[bool, ...]]]:
    """Flatten ``data`` into ``(element, last_bits)`` tokens.

    ``data`` is the stream's *lifetime*: a flat list whose items are
    D-level nested structures (for D=1 each item is a list of elements
    — Figure 1's ``[[H,e,l,l,o],[W,o,r,l,d]]`` is two 1-D sequences;
    for D=0 the items are the elements themselves). ``last_bits[d]`` is
    True when the token terminates the level-d sequence containing it
    (d = 0 innermost). An empty sequence at level ``l`` yields a
    ``(_EMPTY, ...)`` token with only bit ``l-1`` set — last bits are
    downward-closed for element tokens by construction, but *not* for
    empty-sequence tokens (an empty outer sequence contains no inner
    sequence to terminate)."""
    if dim == 0:
        return [(v, ()) for v in data]

    tokens: List[Tuple[Any, Tuple[bool, ...]]] = []

    def rec(seq: Sequence, level: int) -> None:
        # ``seq`` is a level-`level` structure; level 1 holds elements.
        if len(seq) == 0:
            bits = tuple(dd == level - 1 for dd in range(dim))
            tokens.append((_EMPTY, bits))
            return
        if level == 1:
            for i, v in enumerate(seq):
                bits = [i == len(seq) - 1] + [False] * (dim - 1)
                tokens.append((v, tuple(bits)))
            return
        for i, sub in enumerate(seq):
            start = len(tokens)
            rec(sub, level - 1)
            if i == len(seq) - 1 and len(tokens) > start:
                v, bits = tokens[-1]
                b = list(bits)
                b[level - 1] = True
                tokens[-1] = (v, tuple(b))

    for item in data:
        rec(item, dim)
    return tokens


class _Empty:
    """Sentinel marking an empty-sequence token."""

    def __repr__(self) -> str:
        return "<empty>"


_EMPTY = _Empty()


def serialize(
    data: Any,
    *,
    lanes: int,
    dimensionality: int = 0,
    complexity: int = 1,
    seed: Optional[int] = None,
) -> Trace:
    """Serialize nested-sequence ``data`` into a legal trace at the
    given complexity.

    Without ``seed`` the canonical minimal trace is produced (the
    C = 1 organisation of Figure 1, using higher-complexity freedoms
    only where required, e.g. empty sequences need C >= 4). With a
    ``seed``, the freedoms the complexity level permits are exercised
    randomly but deterministically: non-full transfers (C >= 2), stalls
    (C >= 3), deferred closes (C >= 4), padding transfers (C >= 5),
    misalignment (C >= 6), strobe holes (C >= 7) and per-lane postponed
    *last* (C = 8).
    """
    n, d, c = lanes, dimensionality, complexity
    tokens = _flatten(data, d)
    rng = np.random.default_rng(seed) if seed is not None else None
    if any(v is _EMPTY for v, _ in tokens) and c < 4:
        raise ValueError(f"empty sequences require complexity >= 4, got {c}")

    if c >= 8:
        return _serialize_c8(tokens, n, d, rng)
    return _serialize_per_transfer(tokens, n, d, c, rng)


def _serialize_per_transfer(tokens, n: int, d: int, c: int, rng) -> Trace:
    """C < 8: split tokens into innermost sequences, each transferred
    in its own run of transfers with per-transfer last flags."""
    # Group tokens into innermost sequences (split after any closing
    # token — within an innermost sequence no last bit is set).
    seqs: List[List[Tuple[Any, Tuple[bool, ...]]]] = [[]]
    for tok in tokens:
        seqs[-1].append(tok)
        if d >= 1 and any(tok[1]):
            seqs.append([])
    if seqs and not seqs[-1]:
        seqs.pop()

    trace: Trace = []
    for seq in seqs:
        values = [v for v, _ in seq if v is not _EMPTY]
        final_bits = seq[-1][1] if d >= 1 else ()
        if not values:
            # Empty sequence: a transfer with zero active lanes (C>=4).
            trace.append(
                Transfer(
                    lanes=(None,) * n,
                    strb=(False,) * n,
                    stai=0,
                    endi=0,
                    last=tuple(final_bits),
                )
            )
            continue
        # Chunk the sequence into transfers.
        chunks: List[List[Any]] = []
        i = 0
        while i < len(values):
            size = n
            if rng is not None and c >= 2 and len(values) - i > 1:
                # Non-full transfers permitted mid-sequence.
                size = int(rng.integers(1, n + 1))
            chunks.append(values[i : i + size])
            i += size
        # C >= 4: optionally defer the closing last flags to their own
        # empty transfer after the final element chunk.
        defer_close = (
            rng is not None and c >= 4 and d >= 1 and any(final_bits) and rng.random() < 0.3
        )
        for ci, chunk in enumerate(chunks):
            is_final = ci == len(chunks) - 1 and not defer_close
            stai = 0
            if rng is not None and c >= 6 and n - len(chunk) > 0:
                stai = int(rng.integers(0, n - len(chunk) + 1))
            lane_vals: List[Any] = [None] * n
            strb = [False] * n
            if rng is not None and c >= 7:
                # Arbitrary strobe holes: place chunk on random lanes.
                pos = sorted(rng.choice(n, size=len(chunk), replace=False))
                for p, v in zip(pos, chunk):
                    lane_vals[p] = v
                    strb[p] = True
                stai_, endi_ = 0, n - 1
            else:
                for k, v in enumerate(chunk):
                    lane_vals[stai + k] = v
                    strb[stai + k] = True
                stai_, endi_ = stai, stai + len(chunk) - 1
            trace.append(
                Transfer(
                    lanes=tuple(lane_vals),
                    strb=tuple(strb),
                    stai=stai_,
                    endi=endi_,
                    last=tuple(final_bits) if is_final and d >= 1 else ((False,) * d if d >= 1 else None),
                )
            )
            if rng is not None and c >= 3 and rng.random() < 0.25:
                trace.append(None)  # stall mid- or post-sequence
        if defer_close:
            if rng is not None and c >= 3 and rng.random() < 0.5:
                trace.append(None)
            trace.append(
                Transfer(
                    lanes=(None,) * n,
                    strb=(False,) * n,
                    stai=0,
                    endi=0,
                    last=tuple(final_bits),
                )
            )
        if rng is not None and c >= 5 and rng.random() < 0.15:
            # Pure padding transfer: no active lanes, no last flags.
            trace.append(
                Transfer(
                    lanes=(None,) * n,
                    strb=(False,) * n,
                    stai=0,
                    endi=0,
                    last=(False,) * d if d >= 1 else None,
                )
            )
    return trace


def _serialize_c8(tokens, n: int, d: int, rng) -> Trace:
    """C = 8: elements from different sequences may share a transfer;
    last is per lane and may be postponed onto inactive lanes."""
    trace: Trace = []
    lane_vals: List[Any] = []
    lane_strb: List[bool] = []
    lane_last: List[Tuple[bool, ...]] = []

    def flush() -> None:
        nonlocal lane_vals, lane_strb, lane_last
        if not lane_vals:
            return
        pad = n - len(lane_vals)
        lv = lane_vals + [None] * pad
        ls = lane_strb + [False] * pad
        ll = lane_last + [(False,) * d] * pad
        trace.append(
            Transfer(
                lanes=tuple(lv),
                strb=tuple(ls),
                stai=0,
                endi=n - 1,
                lane_last=tuple(ll) if d >= 1 else None,
                last=None,
            )
        )
        lane_vals, lane_strb, lane_last = [], [], []

    for v, bits in tokens:
        postpone = rng is not None and d >= 1 and any(bits) and rng.random() < 0.3
        if v is _EMPTY:
            # Inactive lane carrying only last flags.
            lane_vals.append(None)
            lane_strb.append(False)
            lane_last.append(tuple(bits))
        elif postpone:
            # Element now, last flags on a later inactive lane.
            lane_vals.append(v)
            lane_strb.append(True)
            lane_last.append((False,) * d)
            if len(lane_vals) == n:
                flush()
            lane_vals.append(None)
            lane_strb.append(False)
            lane_last.append(tuple(bits))
        else:
            lane_vals.append(v)
            lane_strb.append(True)
            lane_last.append(tuple(bits) if d >= 1 else ())
        if len(lane_vals) == n:
            flush()
        if rng is not None and rng.random() < 0.15:
            flush()
            trace.append(None)
    flush()
    return trace


def deserialize(trace: Trace, *, dimensionality: int = 0) -> Any:
    """Reconstruct the nested data from a trace. Handles every legal
    organisation at any complexity: strobe holes, indices (significant
    only under an all-ones strobe, fix #2), per-transfer and per-lane
    (postponed) last flags."""
    d = dimensionality
    if d == 0:
        out: List[Any] = []
        for t in trace:
            if t is not None:
                out.extend(t.active_values())
        return out

    # Stack of partially built sequences, innermost first; stack[d] is
    # the stream's lifetime list.
    stack: List[List[Any]] = [[] for _ in range(d + 1)]

    def close(bits: Tuple[bool, ...]) -> None:
        """Fold finished sequences into their parents, ascending. A bit
        at level dd folds stack[dd] into stack[dd+1]; an empty-sequence
        close sets only its own level's bit, so lower stacks (all
        empty) are left untouched — yielding the empty sequence."""
        for dd in range(d):
            if bits[dd]:
                stack[dd + 1].append(stack[dd])
                stack[dd] = []

    for t in trace:
        if t is None:
            continue
        if t.lane_last is not None:
            # C8: walk lanes; every lane may carry an element and/or
            # close dimensions (inactive lanes close postponed ones).
            for i in range(t.n):
                if t.strb[i]:
                    stack[0].append(t.lanes[i])
                close(t.lane_last[i])
        else:
            for v in t.active_values():
                stack[0].append(v)
            close(t.last or (False,) * d)
    return stack[d]
