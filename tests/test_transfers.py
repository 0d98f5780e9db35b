"""Parametrized serializer/deserializer round trips across the whole
complexity x lanes x dimensionality space, plus targeted behaviours."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.sim import deserialize, serialize, validate_trace

DATASETS = [
    ("hello", [list("Hello"), list("World")], 1),
    ("ragged", [[1], [2, 3], [4, 5, 6, 7, 8, 9]], 1),
    ("nested", [[[1, 2], [3]], [[4, 5, 6], [7]]], 2),
    ("flat", [list(range(17))], 1),
    ("deep", [[[[1], [2, 3]], [[4]]], [[[5, 6]]]], 3),
]

EMPTYISH = [
    ("empty-lifetime", [], 1),
    ("empty-seq", [[]], 1),
    ("empty-mixed", [[], [1, 2], []], 1),
    ("empty-outer", [[[]], []], 2),
]


@pytest.mark.parametrize("name,data,dim", DATASETS)
@pytest.mark.parametrize("complexity", range(1, 9))
@pytest.mark.parametrize("lanes", [1, 3, 5])
def test_canonical_round_trip(name, data, dim, complexity, lanes):
    trace = serialize(data, lanes=lanes, dimensionality=dim, complexity=complexity)
    validate_trace(trace, lanes=lanes, dimensionality=dim, complexity=complexity)
    assert deserialize(trace, dimensionality=dim) == data


@pytest.mark.parametrize("name,data,dim", DATASETS)
@pytest.mark.parametrize("complexity", range(1, 9))
@pytest.mark.parametrize("seed", [1, 7])
def test_randomized_round_trip(name, data, dim, complexity, seed):
    trace = serialize(data, lanes=4, dimensionality=dim, complexity=complexity, seed=seed)
    validate_trace(trace, lanes=4, dimensionality=dim, complexity=complexity)
    assert deserialize(trace, dimensionality=dim) == data


@pytest.mark.parametrize("name,data,dim", EMPTYISH)
@pytest.mark.parametrize("complexity", [4, 5, 8])
def test_empty_sequences_round_trip(name, data, dim, complexity):
    trace = serialize(data, lanes=2, dimensionality=dim, complexity=complexity)
    validate_trace(trace, lanes=2, dimensionality=dim, complexity=complexity)
    assert deserialize(trace, dimensionality=dim) == data


@pytest.mark.parametrize("name,data,dim", EMPTYISH[1:])
@pytest.mark.parametrize("complexity", [1, 2, 3])
def test_empty_sequences_need_c4(name, data, dim, complexity):
    with pytest.raises(ValueError, match="complexity >= 4"):
        serialize(data, lanes=2, dimensionality=dim, complexity=complexity)


class TestDimensionalityZero:
    @pytest.mark.parametrize("complexity", range(1, 9))
    def test_round_trip(self, complexity):
        data = list(range(11))
        trace = serialize(data, lanes=4, dimensionality=0, complexity=complexity)
        validate_trace(trace, lanes=4, dimensionality=0, complexity=complexity)
        assert deserialize(trace, dimensionality=0) == data

    def test_no_last_signal(self):
        trace = serialize([1, 2, 3], lanes=2, dimensionality=0, complexity=1)
        for t in trace:
            assert t.last is None and t.lane_last is None

    def test_final_transfer_may_be_partial(self):
        trace = serialize([1, 2, 3], lanes=2, dimensionality=0, complexity=1)
        assert [len(t.active_lanes()) for t in trace] == [2, 1]


class TestMonotonicity:
    """A trace legal at complexity C is legal at every C' >= C with the
    same signal interpretation (below the per-lane-last switch at C8)."""

    @pytest.mark.parametrize("c_src", range(1, 8))
    def test_upward_compatible(self, c_src):
        data = [[1, 2, 3], [4, 5]]
        for seed in (None, 3):
            trace = serialize(data, lanes=3, dimensionality=1, complexity=c_src, seed=seed)
            for c_sink in range(c_src, 8):
                validate_trace(trace, lanes=3, dimensionality=1, complexity=c_sink)

    @pytest.mark.parametrize("c_high,c_low", [(2, 1), (3, 2), (6, 5), (7, 6)])
    def test_freedom_detected_below(self, c_high, c_low):
        data = [list(range(9)), list(range(4))]
        from repro.sim import TraceError

        violated = False
        for seed in range(25):
            trace = serialize(
                data, lanes=4, dimensionality=1, complexity=c_high, seed=seed
            )
            try:
                validate_trace(trace, lanes=4, dimensionality=1, complexity=c_low)
            except TraceError:
                violated = True
                break
        assert violated, f"no C={c_high} trace violated C={c_low}"


@settings(max_examples=60, deadline=None)
@given(
    data=st.lists(st.lists(st.integers(0, 255), max_size=8), max_size=6),
    complexity=st.integers(4, 8),
    lanes=st.integers(1, 6),
    seed=st.integers(0, 2**16),
)
def test_property_round_trip(data, complexity, lanes, seed):
    """Any nested data, any complexity >= 4 (empties allowed), any lane
    count: serialize -> validate -> deserialize is the identity."""
    trace = serialize(data, lanes=lanes, dimensionality=1, complexity=complexity, seed=seed)
    validate_trace(trace, lanes=lanes, dimensionality=1, complexity=complexity)
    assert deserialize(trace, dimensionality=1) == data


@settings(max_examples=40, deadline=None)
@given(
    data=st.lists(st.lists(st.integers(0, 9), min_size=1, max_size=8), max_size=5),
    complexity=st.integers(1, 8),
)
def test_property_round_trip_nonempty(data, complexity):
    """Non-empty sequences round-trip at every complexity."""
    trace = serialize(data, lanes=3, dimensionality=1, complexity=complexity, seed=11)
    validate_trace(trace, lanes=3, dimensionality=1, complexity=complexity)
    assert deserialize(trace, dimensionality=1) == data
