"""Composability-overhead benchmark: the TIL-declared, contract-checked
Streamlet pipeline vs a hand-written Spark query, SF=0.1.

The IR's promise is that typed composition costs interface checking at
*build* time, not execution time: both variants compose to equivalent
Catalyst plans, so their action times should be statistically
indistinguishable (ratio ~1x).
"""
import pytest

from repro import synth_data
from repro.spark_backend.tpch_demo import (
    build_backend,
    q3_hand_written,
    q6_hand_written,
)

SF = 0.1


@pytest.fixture(scope="module")
def data(spark):
    d = {
        "lineitem": synth_data.lineitem(spark, sf=SF).cache(),
        "orders": synth_data.orders(spark, sf=SF).cache(),
        "customer": synth_data.customer(spark, sf=SF).cache(),
    }
    for df in d.values():
        df.count()  # materialize the cache so IO is off the clock
    return d


@pytest.fixture(scope="module")
def backend():
    return build_backend()


@pytest.mark.benchmark(group="q6")
def test_q6_composed(benchmark, data, backend):
    def run():
        out = backend.run("tpch", "q6", {"lineitem": data["lineitem"]})
        return out["revenue"].collect()

    rows = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=1)
    assert rows[0]["revenue"] > 0


@pytest.mark.benchmark(group="q6")
def test_q6_hand_written(benchmark, data):
    def run():
        return q6_hand_written(data["lineitem"]).collect()

    rows = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=1)
    assert rows[0]["revenue"] > 0


@pytest.mark.benchmark(group="q3")
def test_q3_composed(benchmark, data, backend):
    def run():
        out = backend.run(
            "tpch",
            "q3",
            {
                "lineitem": data["lineitem"],
                "orders": data["orders"],
                "customer": data["customer"],
            },
        )
        return out["result"].count()

    n = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=1)
    assert n > 0


@pytest.mark.benchmark(group="q3")
def test_q3_hand_written(benchmark, data):
    def run():
        return q3_hand_written(
            data["lineitem"], data["orders"], data["customer"]
        ).count()

    n = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=1)
    assert n > 0


@pytest.mark.benchmark(group="build")
def test_pipeline_build_cost(benchmark, data, backend):
    """Cost of composition + contract checking alone (no action): this
    is the price of the typed interface layer."""

    def build():
        return backend.run("tpch", "q6", {"lineitem": data["lineitem"]})

    out = benchmark(build)
    assert out["revenue"].schema.fieldNames() == ["revenue"]
