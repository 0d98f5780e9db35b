"""Lowering: split a logical Stream into its physical streams.

A port's logical Stream may contain nested Streams (inside Group/Union
fields, or directly as its ``data``). Lowering produces one
:class:`~repro.core.physical.PhysicalStream` per physical stream, with
hierarchical names: a nested Stream reached through field path
``a.b`` under port ``p`` is named ``p__a__b`` (this naming also backs
the VHDL backend's signal names, Listing 4).

Property propagation (paper Section 4.1):

* *throughput* multiplies down the hierarchy (a child's throughput is
  relative to its parent);
* *dimensionality* of a child is its own plus its parent's, when its
  synchronicity is ``Sync``/``Desync``; the ``Flat`` variants omit the
  redundant parent ``last`` bits;
* *direction* composes: a ``Reverse`` child of a ``Reverse`` child flows
  ``Forward`` again;
* *complexity* and *user* are per-Stream and do not propagate.

Directly nested Streams (a Stream whose ``data`` is itself a Stream) are
combined into a single physical stream — unless **both** levels must be
retained because they carry a ``user`` signal and/or have ``keep`` set,
in which case uniquely named physical streams cannot be created for
both and lowering raises :class:`NestedStreamError` (paper Section 8.1,
issue #1 — the prototype toolchain "simply returns an error").
"""
from __future__ import annotations

from dataclasses import replace
from fractions import Fraction
from typing import List, Tuple

from .physical import PhysicalStream
from .types import Direction, Group, LogicalType, Stream, TypeError_, Union


class NestedStreamError(TypeError_):
    """Raised for directly nested Streams which must both be retained
    (paper Section 8.1, issue #1)."""


def _must_retain(s: Stream) -> bool:
    """A Stream must become its own physical stream when it carries a
    user signal or has ``keep`` set."""
    return s.keep or s.user is not None


def _element_width_stripped(t: LogicalType) -> int:
    """Element width of ``t`` with nested Stream subtrees contributing
    zero bits (they are split off into their own physical streams)."""
    if isinstance(t, Stream):
        return 0
    if isinstance(t, Group):
        return sum(_element_width_stripped(f.typ) for f in t.fields)
    if isinstance(t, Union):
        return t.tag_width + max(_element_width_stripped(f.typ) for f in t.fields)
    return t.element_width()


def _nested_streams(t: LogicalType, path: Tuple[str, ...] = ()) -> List[Tuple[Tuple[str, ...], Stream]]:
    """All Streams nested inside element-manipulating structure of ``t``
    (not including ``t`` itself when it is a Stream), with field paths."""
    out: List[Tuple[Tuple[str, ...], Stream]] = []
    if isinstance(t, (Group, Union)):
        for f in t.fields:
            if isinstance(f.typ, Stream):
                out.append((path + (f.name,), f.typ))
            else:
                out.extend(_nested_streams(f.typ, path + (f.name,)))
    return out


def _user_width(s: Stream) -> int:
    return s.user.element_width() if s.user is not None else 0


def split_stream(name: str, stream: Stream) -> List[PhysicalStream]:
    """Split the logical ``stream`` carried by port ``name`` into
    physical streams, root first, then nested streams depth-first in
    field-declaration order."""
    if not isinstance(stream, Stream):
        raise TypeError_(f"port {name!r} must carry a Stream type, got {type(stream).__name__}")
    return _split(name, stream, Fraction(1), 0, Direction.FORWARD)


def _split(
    name: str,
    s: Stream,
    acc_throughput: Fraction,
    acc_dim: int,
    acc_dir: Direction,
) -> List[PhysicalStream]:
    throughput = acc_throughput * s.throughput
    dim = s.dimensionality + (acc_dim if s.synchronicity.inherits_dimensionality else 0)
    direction = acc_dir.reverse() if s.direction is Direction.REVERSE else acc_dir

    # Directly nested Stream as data: combine into one physical stream,
    # unless both levels must be retained (Section 8.1 issue #1).
    if isinstance(s.data, Stream):
        child = s.data
        if _must_retain(s) and _must_retain(child):
            raise NestedStreamError(
                f"stream {name!r}: directly nested Streams where both carry a "
                "user signal and/or keep cannot be given uniquely named "
                "physical streams (Tydi spec issue #1)"
            )
        # At most one level must be retained, so the combined physical
        # stream can carry that level's user signal (at most one of the
        # two user widths is nonzero).
        combined = _split(name, child, throughput, dim, direction)
        if _must_retain(s) and _user_width(s) > 0:
            combined[0] = replace(combined[0], user_width=_user_width(s))
        return combined

    lanes = -(-throughput.numerator // throughput.denominator)
    root = PhysicalStream(
        name=name,
        element_width=_element_width_stripped(s.data),
        lanes=lanes,
        dimensionality=dim,
        complexity=s.complexity,
        user_width=_user_width(s),
        direction=direction,
    )
    nested = _nested_streams(s.data)
    # A root whose element content was entirely stripped into child
    # streams carries no information of its own: omit it (Tydi signal
    # omission), unless keep/user/dimensionality retain it, or the data
    # is genuinely element-only (a Stream of Null still transfers
    # one-valued data via its handshake). This is what makes the paper's
    # two AXI4 forms — five ports vs one Group with Reverse Streams —
    # "result in identical physical streams" (Section 8.3).
    omit_root = (
        bool(nested)
        and root.element_width == 0
        and root.dimensionality == 0
        and root.user_width == 0
        and not s.keep
        and not s.data.is_element_only()
    )
    out = [] if omit_root else [root]
    for path, child in nested:
        child_name = name + "__" + "__".join(path)
        out.extend(_split(child_name, child, throughput, dim, direction))
    return out
