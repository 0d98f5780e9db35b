"""TIL-declared TPC-H pipelines executed on the Spark backend and
oracle-checked against DuckDB (SF=0.01)."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.spark_backend.tpch_demo import (
    Q3_SQL,
    Q6_SQL,
    build_backend,
    q3_hand_written,
    q6_hand_written,
)

SF = 0.01


@pytest.fixture(scope="module")
def data(spark):
    return {
        "lineitem": synth_data.lineitem(spark, sf=SF),
        "orders": synth_data.orders(spark, sf=SF),
        "customer": synth_data.customer(spark, sf=SF),
    }


@pytest.fixture(scope="module")
def backend():
    return build_backend()


class TestQ6:
    def test_composed_pipeline_matches_duckdb(self, spark, data, backend):
        out = backend.run("tpch", "q6", {"lineitem": data["lineitem"]})
        assert_equivalent(out["revenue"], Q6_SQL, lineitem=data["lineitem"])

    def test_composed_equals_hand_written(self, data, backend):
        out = backend.run("tpch", "q6", {"lineitem": data["lineitem"]})
        composed = out["revenue"].collect()[0]["revenue"]
        hand = q6_hand_written(data["lineitem"]).collect()[0]["revenue"]
        assert composed == pytest.approx(hand)

    def test_individual_streamlets_compose(self, data, backend):
        # Run the two linked streamlets separately and chain manually —
        # same result as the structural composition.
        f = backend.run("tpch", "q6_filter", {"input": data["lineitem"]})
        a = backend.run("tpch", "q6_agg", {"input": f["output"]})
        assert_equivalent(a["output"].withColumnRenamed("revenue", "revenue"),
                          Q6_SQL, lineitem=data["lineitem"])


class TestQ3:
    def test_composed_pipeline_matches_duckdb(self, spark, data, backend):
        out = backend.run(
            "tpch",
            "q3",
            {
                "lineitem": data["lineitem"],
                "orders": data["orders"],
                "customer": data["customer"],
            },
        )
        assert_equivalent(
            out["result"],
            Q3_SQL,
            lineitem=data["lineitem"],
            orders=data["orders"],
            customer=data["customer"],
        )

    def test_composed_equals_hand_written(self, data, backend):
        out = backend.run(
            "tpch",
            "q3",
            {
                "lineitem": data["lineitem"],
                "orders": data["orders"],
                "customer": data["customer"],
            },
        )
        composed = out["result"].count()
        hand = q3_hand_written(
            data["lineitem"], data["orders"], data["customer"]
        ).count()
        assert composed == hand > 0


class TestContractsAtRuntime:
    def test_wrong_input_schema_rejected(self, data, backend):
        from repro.spark_backend.schema import SchemaMismatch

        bad = data["lineitem"].drop("l_tax")
        with pytest.raises(SchemaMismatch):
            backend.run("tpch", "q6", {"lineitem": bad})

    def test_wrong_input_ports_rejected(self, data, backend):
        with pytest.raises(ValueError, match="in-ports"):
            backend.run("tpch", "q6", {"wrong": data["lineitem"]})

    def test_misbehaving_substitute_caught_by_output_contract(self, data, backend):
        # Substitute the aggregate with one that emits a wrongly-named
        # column: the out-port contract catches it at composition time.
        def bad_agg(ins):
            return {"output": ins["input"].limit(1).selectExpr("l_orderkey AS rev")}

        old = backend.registry.substitute("q6_agg", bad_agg)
        try:
            from repro.spark_backend.schema import SchemaMismatch

            with pytest.raises(SchemaMismatch):
                backend.run("tpch", "q6", {"lineitem": data["lineitem"]})
        finally:
            backend.registry.substitute("q6_agg", old)

    def test_substitution_for_testing(self, spark, data, backend):
        # Section 6.2: substitute the filter with an identity stub and
        # verify the downstream aggregate alone.
        def identity(ins):
            return {"output": ins["input"]}

        old = backend.registry.substitute("q6_filter", identity)
        try:
            out = backend.run("tpch", "q6", {"lineitem": data["lineitem"]})
            assert_equivalent(
                out["revenue"],
                "SELECT sum(l_extendedprice * l_discount) AS revenue FROM lineitem",
                lineitem=data["lineitem"],
            )
        finally:
            backend.registry.substitute("q6_filter", old)

    def test_reverse_ports_rejected(self, backend, data):
        from repro.til import parse_project
        from repro.spark_backend import SparkBackend
        from repro.spark_backend.streamlets import BehaviorRegistry

        proj = parse_project(
            """
            namespace bad {
            type req = Stream(data: Group(a: Bits(8), resp: Stream(data: Bits(8), direction: Reverse)), complexity: 2);
            streamlet s = (p: in req);
            }
            """
        )
        b = SparkBackend(proj, BehaviorRegistry())
        with pytest.raises(ValueError, match="Reverse"):
            b.run("bad", "s", {"p": data["lineitem"]})


class TestLaziness:
    def test_pipeline_is_lazy(self, data, backend):
        # Running the pipeline must not trigger a Spark job; the result
        # is a composed transformation.
        out = backend.run("tpch", "q6", {"lineitem": data["lineitem"]})
        assert out["revenue"].schema.fieldNames() == ["revenue"]
