"""Section 8.1: the three spec issues surfaced by translating the Tydi
specification to code, and the prototype's solutions."""
import pytest

from repro.core.lower import NestedStreamError, split_stream
from repro.core.physical import PhysicalStream, indices_significant
from repro.core.types import Bits, Stream
from repro.sim.transfers import Transfer


class TestIssue1DirectlyNestedStreams:
    """(1a) A Stream with a direct child Stream as its data, both with
    user and/or keep: uniquely named physical streams are impossible.
    (1b) The prototype toolchain simply returns an error."""

    @pytest.mark.parametrize(
        "parent_kw,child_kw",
        [
            (dict(user=Bits(1)), dict(user=Bits(2))),
            (dict(keep=True), dict(keep=True)),
            (dict(user=Bits(1)), dict(keep=True)),
            (dict(keep=True), dict(user=Bits(2))),
        ],
    )
    def test_error_when_both_retained(self, parent_kw, child_kw):
        s = Stream(data=Stream(data=Bits(8), **child_kw), **parent_kw)
        with pytest.raises(NestedStreamError):
            split_stream("p", s)

    def test_no_error_when_one_side_plain(self):
        s = Stream(data=Stream(data=Bits(8)), user=Bits(1))
        [p] = split_stream("p", s)
        assert p.user_width == 1


class TestIssue2StrobeVsIndices:
    """(2a) Strobe and start/end indices may conflict at higher
    complexities. (2b) Start/end indices are significant only when all
    strobe bits are asserted."""

    def test_indices_win_under_full_strobe(self):
        t = Transfer(
            lanes=(1, 2, 3, 4),
            strb=(True, True, True, True),
            stai=1,
            endi=2,
        )
        assert t.active_values() == [2, 3]

    def test_strobe_wins_when_any_bit_clear(self):
        # Indices claim lanes 1..2, strobe claims 0 and 3: the strobe
        # is significant, the indices are not.
        t = Transfer(
            lanes=(1, None, None, 4),
            strb=(True, False, False, True),
            stai=1,
            endi=2,
        )
        assert t.active_values() == [1, 4]

    def test_helper(self):
        assert indices_significant((1, 1, 1))
        assert not indices_significant((1, 0, 1))


class TestIssue3EndiOmission:
    """(3a) The spec gates endi on complexity >= 5 or dimensionality >
    0 (with throughput > 1), leaving multi-lane streams with no
    dimensionality and complexity < 5 incapable of disabling element
    lanes. (3b) The toolchain assumes endi is solely contingent on
    throughput > 1."""

    def ps(self, **kw):
        base = dict(name="s", element_width=8, lanes=4, dimensionality=0, complexity=2)
        base.update(kw)
        return PhysicalStream(**base)

    def test_the_contradiction_in_the_original_spec(self):
        # Original rule: this stream has 4 lanes but no way to mark the
        # tail lanes inactive — no endi, and no strobe either (C<7, D=0).
        s = self.ps()
        assert not s.has_endi("original")
        assert not s.has_strb()

    def test_the_fix(self):
        assert self.ps().has_endi("paper")

    @pytest.mark.parametrize("c", range(1, 9))
    def test_fix_is_complexity_independent(self, c):
        assert self.ps(complexity=c).has_endi("paper")

    def test_fix_still_omits_on_single_lane(self):
        assert not self.ps(lanes=1).has_endi("paper")

    def test_emitted_signal_sets_differ(self):
        s = self.ps()
        assert "endi" in s.signals("paper")
        assert "endi" not in s.signals("original")
