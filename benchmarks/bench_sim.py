"""Cycle-level simulator throughput across the complexity ladder: the
cost of serializing/validating/deserializing the Figure 1 contract."""
import pytest

from repro.sim import deserialize, serialize, validate_trace

DATA = [list(range(i % 13 + 1)) for i in range(500)]


@pytest.mark.benchmark(group="sim")
@pytest.mark.parametrize("complexity", [1, 4, 8])
def test_serialize_validate_deserialize(benchmark, complexity):
    def run():
        trace = serialize(
            DATA, lanes=4, dimensionality=1, complexity=complexity, seed=3
        )
        validate_trace(trace, lanes=4, dimensionality=1, complexity=complexity)
        return deserialize(trace, dimensionality=1)

    out = benchmark(run)
    assert out == DATA
