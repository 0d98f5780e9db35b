"""Physical streams: signal presence and width rules.

A physical stream is parameterized by element width ``|E|``, number of
element lanes ``N``, dimensionality ``D``, complexity ``C`` and user
width ``|U|``. The Tydi specification's "signal omission" rules decide
which signals exist; this module codifies them, including the paper's
Section 8.1 spec fixes:

* fix #2 — start/end indices are significant only when all strobe bits
  are asserted (``indices_significant``);
* fix #3 — the ``endi`` signal is contingent solely on ``N > 1`` (the
  original spec gates it on ``C >= 5 or D >= 1``, which would make it
  impossible to disable element lanes on multi-lane streams without
  dimensionality at low complexity). The original behaviour remains
  available via ``spec_mode="original"`` so the contradiction itself is
  testable.

Widths are calibrated against the paper's Listing 4 (throughput 128,
D=1, C=7, element = Union(Bits(8), Null) = 9 bits, user = 13 bits →
data 1152, last 1, stai 7, endi 7, strb 128, user 13).
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Dict, Literal

from .types import Direction, TypeError_

SpecMode = Literal["paper", "original"]


@dataclass(frozen=True)
class Signal:
    """One physical signal of a stream: name, bit width, and whether it
    flows with the stream (``'in'`` relative to a sink) or against it
    (only ``ready``)."""

    name: str
    width: int
    reversed_: bool = False


@dataclass(frozen=True)
class PhysicalStream:
    """A single physical stream produced by lowering a logical Stream.

    ``name`` is the double-underscore-joined field path assigned during
    splitting (:mod:`repro.core.lower`); the root stream's path is the
    port name itself.
    """

    name: str
    element_width: int
    lanes: int
    dimensionality: int
    complexity: int
    user_width: int = 0
    direction: Direction = Direction.FORWARD

    def __post_init__(self) -> None:
        if self.lanes < 1:
            raise TypeError_(f"physical stream needs >=1 lane, got {self.lanes}")
        if self.element_width < 0 or self.user_width < 0 or self.dimensionality < 0:
            raise TypeError_("widths and dimensionality must be non-negative")

    # -- signal omission rules -------------------------------------------

    @property
    def index_width(self) -> int:
        """Width of the stai/endi lane-index signals: ceil(log2 N)."""
        return max(1, math.ceil(math.log2(self.lanes))) if self.lanes > 1 else 0

    def has_last(self) -> bool:
        return self.dimensionality >= 1

    def last_width(self) -> int:
        """``D`` bits per transfer below C8; ``N*D`` (per-lane last) at C8."""
        if not self.has_last():
            return 0
        if self.complexity >= 8:
            return self.lanes * self.dimensionality
        return self.dimensionality

    def has_stai(self) -> bool:
        return self.complexity >= 6 and self.lanes > 1

    def has_endi(self, spec_mode: SpecMode = "paper") -> bool:
        if spec_mode == "paper":  # Section 8.1 fix #3
            return self.lanes > 1
        return (self.complexity >= 5 or self.dimensionality >= 1) and self.lanes > 1

    def has_strb(self) -> bool:
        return self.complexity >= 7 or self.dimensionality >= 1

    def signals(self, spec_mode: SpecMode = "paper") -> Dict[str, Signal]:
        """All signals of this physical stream, in canonical order
        (valid, ready, data, last, stai, endi, strb, user)."""
        out: Dict[str, Signal] = {
            "valid": Signal("valid", 1),
            "ready": Signal("ready", 1, reversed_=True),
        }
        if self.element_width > 0:
            out["data"] = Signal("data", self.lanes * self.element_width)
        if self.has_last():
            out["last"] = Signal("last", self.last_width())
        if self.has_stai():
            out["stai"] = Signal("stai", self.index_width)
        if self.has_endi(spec_mode):
            out["endi"] = Signal("endi", self.index_width)
        if self.has_strb():
            out["strb"] = Signal("strb", self.lanes)
        if self.user_width > 0:
            out["user"] = Signal("user", self.user_width)
        return out

    def total_width(self, spec_mode: SpecMode = "paper") -> int:
        """Sum of all signal widths (both directions)."""
        return sum(s.width for s in self.signals(spec_mode).values())


def indices_significant(strb: tuple) -> bool:
    """Section 8.1 fix #2: when a physical stream has both strobe and
    start/end index signals, the indices are significant only when all
    strobe bits are asserted active."""
    return all(bool(b) for b in strb)
