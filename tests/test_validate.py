"""Targeted trace-validator tests: each complexity rule detects its
violation, hand-built traces."""
import pytest

from repro.sim import TraceError, validate_trace
from repro.sim.transfers import Transfer


def t(lanes, strb=None, stai=0, endi=None, last=None, lane_last=None):
    n = len(lanes)
    return Transfer(
        lanes=tuple(lanes),
        strb=tuple(strb if strb is not None else [v is not None for v in lanes]),
        stai=stai,
        endi=endi if endi is not None else n - 1,
        last=last,
        lane_last=lane_last,
    )


F, T = False, True


class TestShapeChecks:
    def test_lane_count_mismatch(self):
        with pytest.raises(TraceError, match="lanes"):
            validate_trace([t([1, 2])], lanes=3, dimensionality=0, complexity=8)

    def test_missing_last_when_dimensional(self):
        with pytest.raises(TraceError, match="last"):
            validate_trace([t([1])], lanes=1, dimensionality=1, complexity=1)

    def test_wrong_last_width(self):
        with pytest.raises(TraceError, match="last must be 2 bits"):
            validate_trace([t([1], last=(T,))], lanes=1, dimensionality=2, complexity=1)

    def test_last_on_dimensionless_stream(self):
        with pytest.raises(TraceError, match="dimensionality-0"):
            validate_trace([t([1], last=(T,))], lanes=1, dimensionality=0, complexity=1)

    def test_c8_requires_per_lane_last(self):
        with pytest.raises(TraceError, match="per-lane"):
            validate_trace([t([1], last=(T,))], lanes=1, dimensionality=1, complexity=8)

    def test_active_lane_without_value(self):
        with pytest.raises(TraceError, match="no element"):
            validate_trace(
                [t([None, 2], strb=[T, T], last=(T,))],
                lanes=2,
                dimensionality=1,
                complexity=1,
            )


class TestC2NonFull:
    def test_non_full_mid_sequence_rejected_at_c1(self):
        trace = [
            t([1, None], strb=[T, F], endi=0, last=(F,)),
            t([2, 3], last=(T,)),
        ]
        with pytest.raises(TraceError, match="C>=2"):
            validate_trace(trace, lanes=2, dimensionality=1, complexity=1)
        validate_trace(trace, lanes=2, dimensionality=1, complexity=2)

    def test_closing_transfer_may_be_partial_at_c1(self):
        trace = [
            t([1, 2], last=(F,)),
            t([3, None], strb=[T, F], endi=0, last=(T,)),
        ]
        validate_trace(trace, lanes=2, dimensionality=1, complexity=1)


class TestC3Stalls:
    def test_stall_mid_sequence_rejected_below_c3(self):
        trace = [t([1, 2], last=(F,)), None, t([3, 4], last=(T,))]
        for c in (1, 2):
            with pytest.raises(TraceError, match="C>=3"):
                validate_trace(trace, lanes=2, dimensionality=1, complexity=c)
        validate_trace(trace, lanes=2, dimensionality=1, complexity=3)

    def test_stall_between_sequences_always_legal(self):
        trace = [t([1, 2], last=(T,)), None, t([3, 4], last=(T,))]
        validate_trace(trace, lanes=2, dimensionality=1, complexity=1)

    def test_stall_before_first_transfer_legal(self):
        trace = [None, t([1, 2], last=(T,))]
        validate_trace(trace, lanes=2, dimensionality=1, complexity=1)


class TestC4EmptyCloses:
    def test_empty_sequence_transfer(self):
        trace = [t([None, None], strb=[F, F], endi=0, last=(T,))]
        with pytest.raises(TraceError, match="C>=4"):
            validate_trace(trace, lanes=2, dimensionality=1, complexity=3)
        validate_trace(trace, lanes=2, dimensionality=1, complexity=4)

    def test_deferred_close(self):
        trace = [
            t([1, 2], last=(F,)),
            t([None, None], strb=[F, F], endi=0, last=(T,)),
        ]
        with pytest.raises(TraceError, match="C>=4"):
            validate_trace(trace, lanes=2, dimensionality=1, complexity=1)
        validate_trace(trace, lanes=2, dimensionality=1, complexity=4)


class TestC5Padding:
    def test_padding_transfer(self):
        trace = [
            t([1, 2], last=(T,)),
            t([None, None], strb=[F, F], endi=0, last=(F,)),
        ]
        with pytest.raises(TraceError, match="C>=5"):
            validate_trace(trace, lanes=2, dimensionality=1, complexity=4)
        validate_trace(trace, lanes=2, dimensionality=1, complexity=5)


class TestC6Stai:
    def test_nonzero_stai(self):
        trace = [t([None, 1], strb=[F, T], stai=1, endi=1, last=(T,))]
        with pytest.raises(TraceError, match="C>=6"):
            validate_trace(trace, lanes=2, dimensionality=1, complexity=5)
        validate_trace(trace, lanes=2, dimensionality=1, complexity=6)


class TestC7Strobe:
    def test_strobe_holes(self):
        trace = [t([1, None, 2], strb=[T, F, T], last=(T,))]
        with pytest.raises(TraceError, match="C>=7"):
            validate_trace(trace, lanes=3, dimensionality=1, complexity=6)
        validate_trace(trace, lanes=3, dimensionality=1, complexity=7)


class TestLastConsistency:
    def test_outer_close_without_inner_rejected_for_elements(self):
        trace = [t([1], last=(F, T))]
        with pytest.raises(TraceError, match="outer dimension"):
            validate_trace(trace, lanes=1, dimensionality=2, complexity=4)

    def test_outer_close_without_inner_ok_when_empty(self):
        # An empty outer sequence terminates dimension 1 only.
        trace = [t([None], strb=[F], last=(F, T))]
        validate_trace(trace, lanes=1, dimensionality=2, complexity=4)

    def test_index_range_sanity(self):
        with pytest.raises(TraceError, match="index range"):
            validate_trace(
                [t([1, 2], stai=1, endi=0, last=(T,))],
                lanes=2,
                dimensionality=1,
                complexity=6,
            )
