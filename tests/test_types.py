"""Unit tests for the Tydi logical type system (paper Section 4.1/4.2.2)."""
from fractions import Fraction

import pytest

from repro.core.types import (
    Bits,
    Direction,
    Field,
    Group,
    Null,
    Stream,
    Synchronicity,
    TypeError_,
    Union,
    compatible,
    group,
    union,
)


class TestNull:
    def test_width_zero(self):
        assert Null().element_width() == 0

    def test_equality(self):
        assert Null() == Null()

    def test_element_only(self):
        assert Null().is_element_only()


class TestBits:
    @pytest.mark.parametrize("w", [1, 2, 8, 54, 64, 1152])
    def test_width(self, w):
        assert Bits(w).element_width() == w

    @pytest.mark.parametrize("w", [0, -1, 1.5, "8"])
    def test_invalid_width(self, w):
        with pytest.raises(TypeError_):
            Bits(w)

    def test_structural_equality(self):
        assert Bits(8) == Bits(8)
        assert Bits(8) != Bits(9)


class TestGroup:
    def test_width_is_sum(self):
        g = group(a=Bits(8), b=Bits(4), c=Null())
        assert g.element_width() == 12

    def test_field_order_preserved(self):
        g = group(z=Bits(1), a=Bits(2))
        assert [f.name for f in g.fields] == ["z", "a"]

    def test_empty_group_rejected(self):
        with pytest.raises(TypeError_):
            Group(())

    def test_duplicate_fields_rejected(self):
        with pytest.raises(TypeError_):
            Group((Field("a", Null()), Field("a", Bits(1))))

    def test_bad_field_name_rejected(self):
        with pytest.raises(TypeError_):
            Field("not valid", Null())

    def test_field_lookup(self):
        g = group(a=Bits(3))
        assert g.field("a") == Bits(3)
        with pytest.raises(KeyError):
            g.field("b")

    def test_field_names_are_type_properties(self):
        # Section 4.2.2: Group(a: Null) is not compatible with
        # Group(b: Null), regardless of physical identity.
        assert group(a=Null()) != group(b=Null())
        assert not compatible(group(a=Null()), group(b=Null()))


class TestUnion:
    def test_tag_width(self):
        assert union(a=Null()).tag_width == 0
        assert union(a=Null(), b=Null()).tag_width == 1
        assert union(a=Null(), b=Null(), c=Null()).tag_width == 2
        assert union(**{f"f{i}": Null() for i in range(4)}).tag_width == 2
        assert union(**{f"f{i}": Null() for i in range(5)}).tag_width == 3

    def test_width_is_tag_plus_max(self):
        # The paper's Listing 3/4: Union(Bits(8), Null) is 9 bits.
        u = union(data=Bits(8), null=Null())
        assert u.element_width() == 9

    def test_exclusive_field_names(self):
        assert union(a=Bits(1)) != union(b=Bits(1))


class TestStream:
    def test_defaults(self):
        s = Stream(data=Bits(8))
        assert s.throughput == Fraction(1)
        assert s.dimensionality == 0
        assert s.complexity == 1
        assert s.direction is Direction.FORWARD
        assert s.synchronicity is Synchronicity.SYNC
        assert s.user is None and not s.keep

    @pytest.mark.parametrize(
        "thr,lanes",
        [(Fraction(1), 1), (Fraction(1, 2), 1), (Fraction(3, 2), 2), (Fraction(128), 128), (2.0, 2)],
    )
    def test_lanes_round_up(self, thr, lanes):
        assert Stream(data=Bits(1), throughput=thr).lanes == lanes

    def test_non_positive_throughput_rejected(self):
        with pytest.raises(TypeError_):
            Stream(data=Bits(1), throughput=0)
        with pytest.raises(TypeError_):
            Stream(data=Bits(1), throughput=Fraction(-1, 2))

    @pytest.mark.parametrize("c", [0, 9, -3])
    def test_complexity_range(self, c):
        with pytest.raises(TypeError_):
            Stream(data=Bits(1), complexity=c)

    @pytest.mark.parametrize("c", list(range(1, 9)))
    def test_all_eight_complexity_levels(self, c):
        assert Stream(data=Bits(1), complexity=c).complexity == c

    def test_negative_dimensionality_rejected(self):
        with pytest.raises(TypeError_):
            Stream(data=Bits(1), dimensionality=-1)

    def test_user_must_be_element_only(self):
        with pytest.raises(TypeError_):
            Stream(data=Bits(1), user=Stream(data=Bits(1)))
        # Element-manipulating user types are fine.
        Stream(data=Bits(1), user=group(a=Bits(2)))

    def test_stream_is_not_element_only(self):
        assert not Stream(data=Bits(1)).is_element_only()
        assert not group(a=Stream(data=Bits(1))).is_element_only()

    def test_stream_has_no_element_width(self):
        with pytest.raises(TypeError_):
            Stream(data=Bits(1)).element_width()

    def test_walk_covers_nested(self):
        s = Stream(data=group(a=Stream(data=Bits(2))), user=group(u=Bits(1)))
        kinds = [type(t).__name__ for t in s.walk()]
        assert kinds.count("Stream") == 2
        assert "Union" not in kinds


class TestDirectionSynchronicity:
    def test_reverse_composes(self):
        assert Direction.FORWARD.reverse() is Direction.REVERSE
        assert Direction.REVERSE.reverse() is Direction.FORWARD

    @pytest.mark.parametrize(
        "sync,inherits",
        [
            (Synchronicity.SYNC, True),
            (Synchronicity.DESYNC, True),
            (Synchronicity.FLATTEN, False),
            (Synchronicity.FLAT_DESYNC, False),
        ],
    )
    def test_flat_variants_omit_parent_dim(self, sync, inherits):
        assert sync.inherits_dimensionality is inherits


class TestCompatibility:
    def test_identical_streams_compatible(self):
        a = Stream(data=Bits(8), complexity=4)
        b = Stream(data=Bits(8), complexity=4)
        assert compatible(a, b)

    def test_complexity_must_be_identical(self):
        # Section 4.2.2: the IR considers ports incompatible when
        # complexity differs, even though the physical spec would allow
        # a lower-complexity source into a higher-complexity sink.
        a = Stream(data=Bits(8), complexity=2)
        b = Stream(data=Bits(8), complexity=3)
        assert not compatible(a, b)

    def test_names_are_not_type_properties(self):
        # Two separately constructed, structurally identical types are
        # fully compatible ("implicit casting").
        a = Stream(data=group(x=Bits(4), y=union(p=Null(), q=Bits(2))))
        b = Stream(data=group(x=Bits(4), y=union(p=Null(), q=Bits(2))))
        assert compatible(a, b)

    @pytest.mark.parametrize(
        "mutation",
        [
            dict(throughput=2),
            dict(dimensionality=1),
            dict(synchronicity=Synchronicity.FLATTEN),
            dict(direction=Direction.REVERSE),
            dict(keep=True),
            dict(user=Bits(1)),
        ],
    )
    def test_any_property_mismatch_is_incompatible(self, mutation):
        base = dict(data=Bits(8))
        assert not compatible(Stream(**base), Stream(**base, **mutation))
