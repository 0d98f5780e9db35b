"""Tydi logical types → Spark SQL schemas.

Mapping (documented in DESIGN.md):

* ``Bits(w)`` — the narrowest Spark integral type with at least ``w``
  bits (Boolean/Byte/Short/Integer/Long), ``BinaryType`` beyond 64.
  A lane may carry any value representable in its width, so interface
  checking accepts any Spark type whose physical width fits: a
  ``Bits(64)`` field admits ``LongType``, ``DoubleType`` and
  ``TimestampType`` alike — Tydi types specify how many bits are
  transferred, interpretation is behavioural;
* ``Group`` — ``StructType`` with one field per Group field;
* ``Union`` — ``StructType`` with a ``tag`` byte plus one nullable
  field per variant;
* ``Null`` — a zero-information field, carried as an always-null
  ``ByteType`` (Spark's ``NullType`` is not Arrow-friendly);
* nested ``Stream`` of dimensionality d — d levels of ``ArrayType``
  around its element type. The idiomatic special case: a nested Stream
  of ``Bits(8)`` (Tydi's encoding of variable-length text) is accepted
  as ``StringType``.

A *port* whose Stream has dimensionality 0 and Group data lowers to a
DataFrame with one column per Group field and one row per element —
exactly the relational shape Spark operators consume.
"""
from __future__ import annotations

from pyspark.sql import types as T

from ..core.types import Bits, Group, LogicalType, Null, Stream, Union


class SchemaMismatch(TypeError):
    """A DataFrame schema does not satisfy a port's Tydi type."""


def _bits_type(width: int) -> T.DataType:
    if width == 1:
        return T.BooleanType()
    if width <= 8:
        return T.ByteType()
    if width <= 16:
        return T.ShortType()
    if width <= 32:
        return T.IntegerType()
    if width <= 64:
        return T.LongType()
    return T.BinaryType()


def element_spark_type(t: LogicalType) -> T.DataType:
    """Canonical Spark type for a logical type in element position."""
    if isinstance(t, Null):
        return T.ByteType()
    if isinstance(t, Bits):
        return _bits_type(t.width)
    if isinstance(t, Group):
        return T.StructType(
            [T.StructField(f.name, element_spark_type(f.typ), True) for f in t.fields]
        )
    if isinstance(t, Union):
        fields = [T.StructField("tag", T.ByteType(), False)]
        fields += [T.StructField(f.name, element_spark_type(f.typ), True) for f in t.fields]
        return T.StructType(fields)
    if isinstance(t, Stream):
        inner = element_spark_type(t.data)
        for _ in range(max(1, t.dimensionality)):
            inner = T.ArrayType(inner)
        return inner
    raise TypeError(f"unsupported logical type {t!r}")


def spark_schema(stream: Stream) -> T.StructType:
    """The canonical DataFrame schema for a port carrying ``stream``.

    Dimensionality-0 Group data → one column per field; anything else →
    a single ``data`` column (wrapped in arrays per dimension)."""
    if stream.dimensionality == 0 and isinstance(stream.data, Group):
        return T.StructType(
            [
                T.StructField(f.name, element_spark_type(f.typ), True)
                for f in stream.data.fields
            ]
        )
    inner = element_spark_type(stream.data)
    for _ in range(stream.dimensionality):
        inner = T.ArrayType(inner)
    return T.StructType([T.StructField("data", inner, True)])


#: Physical bit width of Spark types a lane can carry.
_SPARK_WIDTH = {
    T.BooleanType(): 1,
    T.ByteType(): 8,
    T.ShortType(): 16,
    T.IntegerType(): 32,
    T.DateType(): 32,
    T.FloatType(): 32,
    T.LongType(): 64,
    T.DoubleType(): 64,
    T.TimestampType(): 64,
    T.TimestampNTZType(): 64,
}


def _accepts(t: LogicalType, st: T.DataType) -> bool:
    if isinstance(t, Null):
        return True  # zero information: anything (ignored) fits
    if isinstance(t, Bits):
        if isinstance(st, T.BinaryType):
            return t.width > 64
        w = _SPARK_WIDTH.get(st)
        return w is not None and w <= t.width
    if isinstance(t, Group):
        if not isinstance(st, T.StructType) or len(st.fields) != len(t.fields):
            return False
        return all(
            sf.name == f.name and _accepts(f.typ, sf.dataType)
            for f, sf in zip(t.fields, st.fields)
        )
    if isinstance(t, Union):
        if not isinstance(st, T.StructType) or len(st.fields) != len(t.fields) + 1:
            return False
        if st.fields[0].name != "tag":
            return False
        return all(
            sf.name == f.name and _accepts(f.typ, sf.dataType)
            for f, sf in zip(t.fields, st.fields[1:])
        )
    if isinstance(t, Stream):
        # Variable-length text idiom: Stream of Bits(<=8) as a string.
        if (
            isinstance(st, T.StringType)
            and isinstance(t.data, Bits)
            and t.data.width <= 8
            and t.dimensionality <= 1
        ):
            return True
        depth = max(1, t.dimensionality)
        for _ in range(depth):
            if not isinstance(st, T.ArrayType):
                return False
            st = st.elementType
        return _accepts(t.data, st)
    return False


def check_port_schema(port_name: str, stream: Stream, schema: T.StructType) -> None:
    """Interface contract check: does a DataFrame schema satisfy the
    port's Tydi Stream type? Raises :class:`SchemaMismatch` with the
    offending field otherwise. Field *names* are type properties
    (Section 4.2.2), so names must match exactly; physical widths must
    fit the declared ``Bits``."""
    if stream.dimensionality == 0 and isinstance(stream.data, Group):
        fields = stream.data.fields
        if [f.name for f in schema.fields] != [f.name for f in fields]:
            raise SchemaMismatch(
                f"port {port_name!r}: columns {[f.name for f in schema.fields]} "
                f"!= declared fields {[f.name for f in fields]}"
            )
        for f, sf in zip(fields, schema.fields):
            if not _accepts(f.typ, sf.dataType):
                raise SchemaMismatch(
                    f"port {port_name!r}: column {f.name!r} of Spark type "
                    f"{sf.dataType} does not fit {f.typ}"
                )
        return
    if len(schema.fields) != 1:
        raise SchemaMismatch(
            f"port {port_name!r}: expected a single 'data' column, got {schema.fieldNames()}"
        )
    wrapped: LogicalType = stream
    if not _accepts(wrapped, schema.fields[0].dataType):
        raise SchemaMismatch(
            f"port {port_name!r}: {schema.fields[0].dataType} does not fit {stream}"
        )
