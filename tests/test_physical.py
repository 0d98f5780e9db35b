"""Signal presence/width rules for physical streams, calibrated against
the paper's Listing 4 and the Section 8.1 spec fixes."""
import pytest

from repro.core.physical import PhysicalStream, indices_significant


def ps(**kw):
    base = dict(name="s", element_width=8, lanes=1, dimensionality=0, complexity=1)
    base.update(kw)
    return PhysicalStream(**base)


class TestListing4Calibration:
    """throughput 128, D=1, C=7, |E|=9 (Union(Bits(8),Null)), |U|=13."""

    @pytest.fixture()
    def axi(self):
        return ps(element_width=9, lanes=128, dimensionality=1, complexity=7, user_width=13)

    def test_signal_set(self, axi):
        assert list(axi.signals()) == [
            "valid", "ready", "data", "last", "stai", "endi", "strb", "user",
        ]

    def test_widths(self, axi):
        w = {n: s.width for n, s in axi.signals().items()}
        assert w == {
            "valid": 1, "ready": 1, "data": 1152, "last": 1,
            "stai": 7, "endi": 7, "strb": 128, "user": 13,
        }

    def test_eight_signals_total(self, axi):
        # Table 1's "AXI4-Stream equiv. (VHDL): 8".
        assert len(axi.signals()) == 8


class TestSignalOmission:
    def test_handshake_always_present(self):
        s = ps(element_width=0).signals()
        assert "valid" in s and "ready" in s
        assert s["ready"].reversed_

    def test_data_omitted_when_zero_width(self):
        assert "data" not in ps(element_width=0).signals()

    @pytest.mark.parametrize("d,present", [(0, False), (1, True), (3, True)])
    def test_last_presence(self, d, present):
        assert ("last" in ps(dimensionality=d).signals()) is present

    @pytest.mark.parametrize("c,d,width", [(1, 2, 2), (7, 3, 3), (8, 2, 8), (8, 1, 4)])
    def test_last_width_per_transfer_vs_per_lane(self, c, d, width):
        # D bits below C8; N*D per-lane bits at C8.
        assert ps(lanes=4, dimensionality=d, complexity=c).last_width() == width

    @pytest.mark.parametrize(
        "c,n,present",
        [(5, 4, False), (6, 4, True), (8, 4, True), (6, 1, False)],
    )
    def test_stai_presence(self, c, n, present):
        assert ps(lanes=n, complexity=c).has_stai() is present

    @pytest.mark.parametrize("n,width", [(2, 1), (3, 2), (4, 2), (5, 3), (128, 7)])
    def test_index_width(self, n, width):
        assert ps(lanes=n).index_width == width

    @pytest.mark.parametrize(
        "c,d,present",
        [(6, 0, False), (7, 0, True), (8, 0, True), (1, 1, True), (1, 0, False)],
    )
    def test_strb_presence(self, c, d, present):
        assert ps(lanes=4, complexity=c, dimensionality=d).has_strb() is present

    def test_user_presence(self):
        assert "user" in ps(user_width=3).signals()
        assert "user" not in ps(user_width=0).signals()


class TestSpecFix3Endi:
    """Section 8.1 issue #3: spec makes endi contingent on C>=5 or D>=1,
    leaving multi-lane D=0 low-complexity streams unable to disable
    lanes; the toolchain makes endi solely contingent on N>1."""

    def test_paper_mode_endi_on_any_multilane(self):
        s = ps(lanes=4, complexity=1, dimensionality=0)
        assert s.has_endi("paper")

    def test_original_mode_reproduces_the_contradiction(self):
        # N=4 lanes, no dimensionality, C<5: the original spec omits
        # endi — the stream cannot disable element lanes.
        s = ps(lanes=4, complexity=4, dimensionality=0)
        assert not s.has_endi("original")

    @pytest.mark.parametrize("c", [5, 6, 7, 8])
    def test_original_mode_high_complexity(self, c):
        assert ps(lanes=4, complexity=c).has_endi("original")

    def test_original_mode_dimensionality(self):
        assert ps(lanes=4, complexity=1, dimensionality=1).has_endi("original")

    def test_single_lane_never_has_endi(self):
        assert not ps(lanes=1, complexity=8, dimensionality=2).has_endi("paper")
        assert not ps(lanes=1, complexity=8, dimensionality=2).has_endi("original")


class TestSpecFix2Indices:
    """Section 8.1 issue #2: start/end indices are significant only when
    all strobe bits are asserted."""

    def test_all_strobes_asserted(self):
        assert indices_significant((True, True, True))

    @pytest.mark.parametrize("strb", [(True, False), (False, False), (False, True, True)])
    def test_any_hole_disables_indices(self, strb):
        assert not indices_significant(strb)


class TestTotalWidth:
    def test_total_width_sums_both_directions(self):
        s = ps(element_width=4, lanes=2, dimensionality=1, complexity=8, user_width=3)
        # valid 1 + ready 1 + data 8 + last 2*1 + stai 1 + endi 1 + strb 2 + user 3
        assert s.total_width() == 1 + 1 + 8 + 2 + 1 + 1 + 2 + 3

    def test_invalid_construction(self):
        with pytest.raises(Exception):
            ps(lanes=0)
        with pytest.raises(Exception):
            ps(element_width=-1)
