"""Logical Stream → physical streams splitting (repro.core.lower)."""
from fractions import Fraction

import pytest

from repro.core.lower import NestedStreamError, split_stream
from repro.core.types import (
    Bits,
    Direction,
    Null,
    Stream,
    Synchronicity,
    TypeError_,
    group,
    union,
)


def stream(**kw):
    kw.setdefault("data", Bits(8))
    return Stream(**kw)


class TestRootStream:
    def test_simple_stream_one_physical(self):
        [p] = split_stream("a", stream())
        assert p.name == "a"
        assert p.element_width == 8
        assert p.lanes == 1

    def test_port_must_be_stream(self):
        with pytest.raises(TypeError_):
            split_stream("a", Bits(8))

    def test_group_width(self):
        [p] = split_stream("a", stream(data=group(x=Bits(3), y=Bits(4))))
        assert p.element_width == 7

    def test_union_width(self):
        [p] = split_stream("a", stream(data=union(x=Bits(8), n=Null())))
        assert p.element_width == 9

    def test_null_stream_kept(self):
        # A Stream of Null still transfers one-valued data per handshake.
        [p] = split_stream("a", stream(data=Null()))
        assert p.element_width == 0

    def test_user_width(self):
        [p] = split_stream("a", stream(user=group(u=Bits(5), v=Bits(1))))
        assert p.user_width == 6


class TestNestedStreams:
    def test_field_stream_split_off_with_path_name(self):
        s = stream(data=group(head=Bits(4), tail=Stream(data=Bits(8), complexity=2)))
        phys = split_stream("p", s)
        assert [p.name for p in phys] == ["p", "p__tail"]
        # The nested stream contributes nothing to the parent element.
        assert phys[0].element_width == 4
        assert phys[1].element_width == 8

    def test_deep_path_naming(self):
        s = stream(data=group(a=group(k=Bits(1), b=Stream(data=Bits(1)))))
        phys = split_stream("x", s)
        assert [p.name for p in phys] == ["x", "x__a__b"]

    def test_pure_stream_group_omits_root_and_keeps_deep_names(self):
        s = stream(data=group(a=group(b=Stream(data=Bits(1)))))
        phys = split_stream("x", s)
        assert [p.name for p in phys] == ["x__a__b"]

    def test_throughput_multiplies(self):
        s = stream(
            throughput=Fraction(2),
            data=group(k=Bits(1), c=Stream(data=Bits(8), throughput=Fraction(3))),
        )
        phys = split_stream("p", s)
        assert phys[1].lanes == 6

    def test_fractional_throughput_rounds_up_after_multiplying(self):
        s = stream(
            throughput=Fraction(3, 2),
            data=group(k=Bits(1), c=Stream(data=Bits(8), throughput=Fraction(3, 2))),
        )
        phys = split_stream("p", s)
        assert phys[0].lanes == 2
        assert phys[1].lanes == 3  # 9/4 -> 3

    @pytest.mark.parametrize(
        "sync,child_dim",
        [
            (Synchronicity.SYNC, 3),
            (Synchronicity.DESYNC, 3),
            (Synchronicity.FLATTEN, 1),
            (Synchronicity.FLAT_DESYNC, 1),
        ],
    )
    def test_dimensionality_inheritance(self, sync, child_dim):
        s = stream(
            dimensionality=2,
            data=group(c=Stream(data=Bits(8), dimensionality=1, synchronicity=sync)),
        )
        phys = split_stream("p", s)
        assert phys[0].dimensionality == 2
        assert phys[1].dimensionality == child_dim

    def test_reverse_direction_composes(self):
        inner = Stream(data=Bits(1), direction=Direction.REVERSE)
        s = stream(
            direction=Direction.REVERSE,
            data=group(fwd=Stream(data=Bits(1)), rev=inner),
        )
        phys = split_stream("p", s)
        by_name = {p.name: p for p in phys}
        # Reverse-of-reverse flows forward again.
        assert by_name["p__fwd"].direction is Direction.REVERSE
        assert by_name["p__rev"].direction is Direction.FORWARD

    def test_union_nested_stream(self):
        s = stream(data=union(a=Bits(4), b=Stream(data=Bits(8))))
        phys = split_stream("p", s)
        assert [p.name for p in phys] == ["p", "p__b"]
        # Tag + max over element widths (stream variant contributes 0).
        assert phys[0].element_width == 1 + 4

    def test_complexity_is_per_stream(self):
        s = stream(complexity=2, data=group(k=Bits(1), c=Stream(data=Bits(1), complexity=7)))
        phys = split_stream("p", s)
        assert phys[0].complexity == 2
        assert phys[1].complexity == 7


class TestDirectlyNestedStreams:
    def test_combined_when_neither_retained(self):
        s = stream(data=Stream(data=Bits(8), throughput=Fraction(2), dimensionality=1))
        [p] = split_stream("p", s)
        assert p.element_width == 8
        assert p.lanes == 2
        assert p.dimensionality == 1

    def test_parent_user_carried_by_combined_stream(self):
        s = stream(user=Bits(3), data=Stream(data=Bits(8)))
        [p] = split_stream("p", s)
        assert p.user_width == 3

    def test_child_user_carried_by_combined_stream(self):
        s = stream(data=Stream(data=Bits(8), user=Bits(5)))
        [p] = split_stream("p", s)
        assert p.user_width == 5

    def test_both_retained_is_an_error(self):
        # Section 8.1 issue #1: uniquely named physical streams cannot
        # be created for both; the toolchain returns an error.
        s = stream(user=Bits(1), data=Stream(data=Bits(8), user=Bits(2)))
        with pytest.raises(NestedStreamError):
            split_stream("p", s)

    def test_both_keep_is_an_error(self):
        s = stream(keep=True, data=Stream(data=Bits(8), keep=True))
        with pytest.raises(NestedStreamError):
            split_stream("p", s)

    def test_keep_plus_user_is_an_error(self):
        s = stream(keep=True, data=Stream(data=Bits(8), user=Bits(1)))
        with pytest.raises(NestedStreamError):
            split_stream("p", s)


class TestRootOmission:
    def test_group_of_streams_omits_empty_root(self):
        # Section 8.3: the Group-of-Streams AXI4 form results in
        # identical physical streams to the multi-port form.
        s = stream(data=group(a=Stream(data=Bits(8)), b=Stream(data=Bits(4))))
        phys = split_stream("p", s)
        assert [p.name for p in phys] == ["p__a", "p__b"]

    def test_keep_retains_root(self):
        s = stream(keep=True, data=group(a=Stream(data=Bits(8))))
        phys = split_stream("p", s)
        assert [p.name for p in phys] == ["p", "p__a"]

    def test_user_retains_root(self):
        s = stream(user=Bits(2), data=group(a=Stream(data=Bits(8))))
        assert [p.name for p in split_stream("p", s)] == ["p", "p__a"]

    def test_dimensionality_retains_root(self):
        s = stream(dimensionality=1, data=group(a=Stream(data=Bits(8))))
        assert [p.name for p in split_stream("p", s)] == ["p", "p__a"]

    def test_mixed_element_and_stream_fields_keep_root(self):
        s = stream(data=group(head=Bits(1), tail=Stream(data=Bits(8))))
        assert [p.name for p in split_stream("p", s)] == ["p", "p__tail"]
