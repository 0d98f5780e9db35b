"""Tydi logical types (paper Section 4.1).

The Tydi specification defines five *logical types*: the
stream-manipulating ``Stream`` type and the element-manipulating
``Null``, ``Bits``, ``Group`` and ``Union`` types.

Types here are *structural* (paper Section 4.2.2): identifiers given to
types live in a namespace and are **not** a property of the type itself,
so two types with different names but identical properties are fully
compatible ("implicit casting"). Group/Union *field* names, by contrast,
ARE properties of the type: ``Group(a: Null)`` is incompatible with
``Group(b: Null)``. Structural equality over frozen dataclasses gives
both rules for free.

All types validate their invariants at construction time so that an
invalid type can never enter the IR, mirroring the prototype toolchain's
"codify the rules of the Tydi specification" goal.
"""
from __future__ import annotations

import enum
import re
from dataclasses import dataclass, field
from fractions import Fraction
from typing import Iterator, Tuple, Union as TyUnion

_IDENT_RE = re.compile(r"^[a-zA-Z_][a-zA-Z0-9_]*$")

#: The Tydi specification currently defines 8 levels of complexity
#: (paper Section 4.1, citing [35]).
MIN_COMPLEXITY = 1
MAX_COMPLEXITY = 8


class TypeError_(ValueError):
    """Raised when a logical type violates a Tydi specification rule."""


def _check_ident(name: str, what: str) -> None:
    if not _IDENT_RE.match(name):
        raise TypeError_(f"{what} {name!r} is not a valid identifier")


class Direction(enum.Enum):
    """Whether a Stream flows with or against its parent (Section 4.1)."""

    FORWARD = "Forward"
    REVERSE = "Reverse"

    def reverse(self) -> "Direction":
        return Direction.REVERSE if self is Direction.FORWARD else Direction.FORWARD


class Synchronicity(enum.Enum):
    """Relation between a child Stream and its parent w.r.t. dimensional
    information (Section 4.1).

    ``SYNC``: each parent element has a matching child transfer — the
    child inherits the parent's dimensionality. ``DESYNC``: child
    transfers are of arbitrary size but parent dimensions still apply.
    The ``FLAT`` variants omit the redundant parent ``last`` signals on
    the child, so the parent's dimensionality is *not* added.
    """

    SYNC = "Sync"
    FLATTEN = "Flatten"
    DESYNC = "Desync"
    FLAT_DESYNC = "FlatDesync"

    @property
    def inherits_dimensionality(self) -> bool:
        return self in (Synchronicity.SYNC, Synchronicity.DESYNC)


@dataclass(frozen=True)
class LogicalType:
    """Base class for the five Tydi logical types."""

    def is_element_only(self) -> bool:
        """True when the type contains no ``Stream`` (so it can be
        carried on element lanes or a ``user`` signal)."""
        return all(not isinstance(t, Stream) for t in self.walk())

    def walk(self) -> Iterator["LogicalType"]:
        """Depth-first iterator over this type and all nested types."""
        yield self

    def element_width(self) -> int:
        """Bit width when serialized onto a data lane.

        Only defined for element-manipulating content; nested Streams
        are split off into separate physical streams before this is
        asked (see :mod:`repro.core.lower`).
        """
        raise TypeError_(f"{self!r} has no element width")


@dataclass(frozen=True)
class Null(LogicalType):
    """One-valued data: the only valid value is ``null`` (0 bits)."""

    def element_width(self) -> int:
        return 0


@dataclass(frozen=True)
class Bits(LogicalType):
    """A data signal of ``width`` bits — primitives such as numbers,
    booleans and characters."""

    width: int

    def __post_init__(self) -> None:
        if not isinstance(self.width, int) or self.width < 1:
            raise TypeError_(f"Bits width must be a positive integer, got {self.width!r}")

    def element_width(self) -> int:
        return self.width


@dataclass(frozen=True)
class Field:
    """A named member of a Group or Union."""

    name: str
    typ: LogicalType

    def __post_init__(self) -> None:
        _check_ident(self.name, "field name")


def _check_fields(fields: Tuple[Field, ...], what: str) -> None:
    if not fields:
        raise TypeError_(f"{what} must have at least one field")
    names = [f.name for f in fields]
    if len(set(names)) != len(names):
        raise TypeError_(f"{what} has duplicate field names: {names}")


@dataclass(frozen=True)
class Group(LogicalType):
    """A composite of multiple types where every field is set at the
    same time (a record)."""

    fields: Tuple[Field, ...]

    def __post_init__(self) -> None:
        _check_fields(self.fields, "Group")

    def walk(self) -> Iterator[LogicalType]:
        yield self
        for f in self.fields:
            yield from f.typ.walk()

    def element_width(self) -> int:
        return sum(f.typ.element_width() for f in self.fields)

    def field(self, name: str) -> LogicalType:
        for f in self.fields:
            if f.name == name:
                return f.typ
        raise KeyError(name)


@dataclass(frozen=True)
class Union(LogicalType):
    """An exclusive disjunction of types: only one field is active at a
    time, selected with a *tag* signal of ``ceil(log2 #fields)`` bits."""

    fields: Tuple[Field, ...]

    def __post_init__(self) -> None:
        _check_fields(self.fields, "Union")

    def walk(self) -> Iterator[LogicalType]:
        yield self
        for f in self.fields:
            yield from f.typ.walk()

    @property
    def tag_width(self) -> int:
        return max(1, (len(self.fields) - 1).bit_length()) if len(self.fields) > 1 else 0

    def element_width(self) -> int:
        return self.tag_width + max(f.typ.element_width() for f in self.fields)

    def field(self, name: str) -> LogicalType:
        for f in self.fields:
            if f.name == name:
                return f.typ
        raise KeyError(name)


@dataclass(frozen=True)
class Stream(LogicalType):
    """A logical Stream: a new physical stream carrying ``data``, plus
    properties describing how transfers are organized (Section 4.1).

    Parameters
    ----------
    data:
        The logical type carried on the element lanes. May itself
        contain nested Streams, which are split into separate physical
        streams during lowering.
    throughput:
        Positive rational: expected elements per handshake (relative to
        the parent Stream). Element lanes = ``ceil(throughput)``.
    dimensionality:
        Number of nested-sequence levels; translated to ``last`` bits.
    synchronicity:
        Relation of dimensional information to the parent Stream.
    complexity:
        Source guarantee level, 1 (most restrictive) .. 8.
    direction:
        ``FORWARD`` flows with the parent, ``REVERSE`` against it
        (e.g. a response stream).
    user:
        Optional element-manipulating type carried on a ``user`` signal,
        independent of transfers.
    keep:
        Force this logical Stream to synthesize into its own physical
        stream even when it could be combined with its parent.
    """

    data: LogicalType
    throughput: Fraction = Fraction(1)
    dimensionality: int = 0
    synchronicity: Synchronicity = Synchronicity.SYNC
    complexity: int = 1
    direction: Direction = Direction.FORWARD
    user: LogicalType | None = None
    keep: bool = False

    def __post_init__(self) -> None:
        if not isinstance(self.throughput, Fraction):
            object.__setattr__(self, "throughput", Fraction(self.throughput))
        if self.throughput <= 0:
            raise TypeError_(f"throughput must be positive, got {self.throughput}")
        if not isinstance(self.dimensionality, int) or self.dimensionality < 0:
            raise TypeError_(f"dimensionality must be a natural number, got {self.dimensionality!r}")
        if not (MIN_COMPLEXITY <= self.complexity <= MAX_COMPLEXITY):
            raise TypeError_(
                f"complexity must be in [{MIN_COMPLEXITY}, {MAX_COMPLEXITY}], got {self.complexity}"
            )
        if self.user is not None and not self.user.is_element_only():
            raise TypeError_("user type must be element-manipulating (no Streams)")

    def walk(self) -> Iterator[LogicalType]:
        yield self
        yield from self.data.walk()
        if self.user is not None:
            yield from self.user.walk()

    @property
    def lanes(self) -> int:
        """Number of element lanes: throughput rounded up."""
        return -(-self.throughput.numerator // self.throughput.denominator)


def group(**fields: LogicalType) -> Group:
    """Convenience constructor: ``group(a=Bits(1), b=Null())``.

    Python 3.7+ keeps keyword-argument order, so field order is the
    declaration order, as in TIL.
    """
    return Group(tuple(Field(n, t) for n, t in fields.items()))


def union(**fields: LogicalType) -> Union:
    """Convenience constructor: ``union(a=Bits(8), null=Null())``."""
    return Union(tuple(Field(n, t) for n, t in fields.items()))


def compatible(a: LogicalType, b: LogicalType) -> bool:
    """Port-type compatibility (Section 4.2.2).

    Type identifiers are not type properties, so compatibility is plain
    structural equality — including ``complexity``: although the Tydi
    spec conditionally allows a lower-complexity physical *source* to
    feed a higher-complexity *sink*, logical Streams may contain both
    sink and source physical streams (Reverse children), so the IR
    requires identical complexity.
    """
    return a == b
