"""Tydi logical type → Spark schema mapping and interface contracts
(no SparkSession needed — pure schema manipulation)."""
import pytest
from pyspark.sql import types as T

from repro.core.types import Bits, Null, Stream, group, union
from repro.spark_backend.schema import (
    SchemaMismatch,
    check_port_schema,
    element_spark_type,
    spark_schema,
)


class TestElementMapping:
    @pytest.mark.parametrize(
        "width,expected",
        [
            (1, T.BooleanType()),
            (8, T.ByteType()),
            (16, T.ShortType()),
            (17, T.IntegerType()),
            (32, T.IntegerType()),
            (33, T.LongType()),
            (64, T.LongType()),
            (65, T.BinaryType()),
            (1152, T.BinaryType()),
        ],
    )
    def test_bits(self, width, expected):
        assert element_spark_type(Bits(width)) == expected

    def test_group_is_struct(self):
        st = element_spark_type(group(a=Bits(8), b=Bits(32)))
        assert st == T.StructType(
            [T.StructField("a", T.ByteType()), T.StructField("b", T.IntegerType())]
        )

    def test_union_is_tagged_struct(self):
        st = element_spark_type(union(data=Bits(8), null=Null()))
        assert st.fieldNames() == ["tag", "data", "null"]
        assert st.fields[0].dataType == T.ByteType()

    def test_nested_stream_is_array(self):
        st = element_spark_type(Stream(data=Bits(8), dimensionality=2))
        assert st == T.ArrayType(T.ArrayType(T.ByteType()))


class TestPortSchema:
    def test_dim0_group_becomes_columns(self):
        s = Stream(data=group(k=Bits(64), v=Bits(32)))
        schema = spark_schema(s)
        assert schema.fieldNames() == ["k", "v"]

    def test_dimensional_stream_is_single_data_column(self):
        s = Stream(data=Bits(8), dimensionality=1)
        schema = spark_schema(s)
        assert schema.fieldNames() == ["data"]
        assert schema.fields[0].dataType == T.ArrayType(T.ByteType())


def row_stream(**fields):
    return Stream(data=group(**fields))


class TestContracts:
    def test_exact_match_accepted(self):
        s = row_stream(k=Bits(64), v=Bits(64))
        check_port_schema(
            "p",
            s,
            T.StructType(
                [T.StructField("k", T.LongType()), T.StructField("v", T.DoubleType())]
            ),
        )

    def test_narrower_value_accepted(self):
        # A lane can carry any value representable in its width.
        s = row_stream(k=Bits(64))
        check_port_schema("p", s, T.StructType([T.StructField("k", T.IntegerType())]))

    def test_wider_value_rejected(self):
        s = row_stream(k=Bits(32))
        with pytest.raises(SchemaMismatch):
            check_port_schema("p", s, T.StructType([T.StructField("k", T.LongType())]))

    def test_field_names_are_contractual(self):
        # Section 4.2.2: field identifiers are type properties.
        s = row_stream(k=Bits(64))
        with pytest.raises(SchemaMismatch):
            check_port_schema("p", s, T.StructType([T.StructField("kk", T.LongType())]))

    def test_column_order_is_contractual(self):
        s = row_stream(a=Bits(64), b=Bits(64))
        with pytest.raises(SchemaMismatch):
            check_port_schema(
                "p",
                s,
                T.StructType(
                    [T.StructField("b", T.LongType()), T.StructField("a", T.LongType())]
                ),
            )

    def test_timestamp_fits_64_bits(self):
        s = row_stream(ts=Bits(64))
        check_port_schema("p", s, T.StructType([T.StructField("ts", T.TimestampType())]))

    def test_string_as_char_stream(self):
        # Variable-length text idiom: a nested Stream of Bits(8).
        chars = Stream(data=Bits(8), dimensionality=1)
        s = row_stream(name=chars)
        check_port_schema("p", s, T.StructType([T.StructField("name", T.StringType())]))

    def test_string_rejected_for_wide_element_stream(self):
        wide = Stream(data=Bits(32), dimensionality=1)
        s = row_stream(name=wide)
        with pytest.raises(SchemaMismatch):
            check_port_schema("p", s, T.StructType([T.StructField("name", T.StringType())]))

    def test_array_also_accepted_for_char_stream(self):
        chars = Stream(data=Bits(8), dimensionality=1)
        s = row_stream(name=chars)
        check_port_schema(
            "p", s, T.StructType([T.StructField("name", T.ArrayType(T.ByteType()))])
        )

    def test_missing_column_rejected(self):
        s = row_stream(a=Bits(64), b=Bits(64))
        with pytest.raises(SchemaMismatch):
            check_port_schema("p", s, T.StructType([T.StructField("a", T.LongType())]))
