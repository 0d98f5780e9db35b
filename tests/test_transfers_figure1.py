"""Figure 1: transferring [[H,e,l,l,o],[W,o,r,l,d]] over a 5-lane,
dimensionality-1 stream at complexity 1 vs complexity 8."""
import pytest

from repro.sim import deserialize, serialize, validate_trace

HELLO_WORLD = [list("Hello"), list("World")]


class TestComplexity1:
    """At C=1 all elements must be aligned to the first lane, last data
    is asserted per transfer, and all data must be transferred over
    consecutive cycles and lanes."""

    @pytest.fixture()
    def trace(self):
        return serialize(HELLO_WORLD, lanes=5, dimensionality=1, complexity=1)

    def test_exactly_two_transfers(self, trace):
        assert len(trace) == 2

    def test_no_stall_cycles(self, trace):
        assert all(t is not None for t in trace)

    def test_alignment_and_fullness(self, trace):
        assert trace[0].lanes == tuple("Hello")
        assert trace[1].lanes == tuple("World")
        assert all(all(t.strb) for t in trace)
        assert all(t.stai == 0 and t.endi == 4 for t in trace)

    def test_last_per_transfer(self, trace):
        assert trace[0].last == (True,)
        assert trace[1].last == (True,)
        assert trace[0].lane_last is None

    def test_validates_at_every_complexity(self, trace):
        for c in range(1, 8):
            validate_trace(trace, lanes=5, dimensionality=1, complexity=c)

    def test_round_trip(self, trace):
        assert deserialize(trace, dimensionality=1) == HELLO_WORLD


class TestComplexity8:
    """At C=8 there are no requirements on alignment, transfers may be
    postponed, and last is asserted per lane — possibly on an inactive
    lane for a previous element or transfer."""

    def test_canonical_c8_packs_across_sequences(self):
        trace = serialize(HELLO_WORLD, lanes=5, dimensionality=1, complexity=8)
        # Without a seed the canonical trace still packs densely: 10
        # elements over 5 lanes in 2 transfers with per-lane last.
        transfers = [t for t in trace if t is not None]
        assert len(transfers) == 2
        assert transfers[0].lane_last is not None
        validate_trace(trace, lanes=5, dimensionality=1, complexity=8)
        assert deserialize(trace, dimensionality=1) == HELLO_WORLD

    @pytest.mark.parametrize("seed", range(12))
    def test_randomized_organisations_round_trip(self, seed):
        trace = serialize(
            HELLO_WORLD, lanes=5, dimensionality=1, complexity=8, seed=seed
        )
        validate_trace(trace, lanes=5, dimensionality=1, complexity=8)
        assert deserialize(trace, dimensionality=1) == HELLO_WORLD

    def test_c8_freedom_is_illegal_at_c1(self):
        from repro.sim import TraceError

        violations = 0
        for seed in range(10):
            trace = serialize(
                HELLO_WORLD, lanes=5, dimensionality=1, complexity=8, seed=seed
            )
            try:
                validate_trace(trace, lanes=5, dimensionality=1, complexity=1)
            except TraceError:
                violations += 1
        assert violations >= 8

    def test_postponed_last_on_inactive_lane(self):
        """Hand-built Figure 1 organisation: last for 'Hello' asserted
        on an inactive lane of the next transfer."""
        from repro.sim.transfers import Transfer

        f = (False,)
        t_ = (True,)
        trace = [
            Transfer(
                lanes=tuple("Hell") + (None,),
                strb=(True,) * 4 + (False,),
                stai=0,
                endi=4,
                lane_last=(f, f, f, f, f),
            ),
            Transfer(
                lanes=("o", None, "W", "o", "r"),
                strb=(True, False, True, True, True),
                stai=0,
                endi=4,
                # lane 1 is inactive but closes the 'Hello' sequence.
                lane_last=(f, t_, f, f, f),
            ),
            Transfer(
                lanes=("l", "d", None, None, None),
                strb=(True, True, False, False, False),
                stai=0,
                endi=4,
                lane_last=(f, t_, f, f, f),
            ),
        ]
        validate_trace(trace, lanes=5, dimensionality=1, complexity=8)
        assert deserialize(trace, dimensionality=1) == HELLO_WORLD
