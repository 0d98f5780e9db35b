"""The same Tydi-typed Streamlet pipelines on Structured Streaming.

The IR contributes interfaces, not behaviour — so the identical TIL
declarations, behaviour registry, and SparkBackend composition run
unchanged over a *streaming* DataFrame (file source → memory sink).
Contract checking works on streaming schemas exactly as on batch ones;
the operators are Structured-Streaming-compatible transformations
(stateless filters, stream aggregation in complete mode, stream-static
joins)."""
import pytest

from repro import synth_data
from repro.spark_backend.tpch_demo import build_backend, q6_hand_written

SF = 0.002


@pytest.fixture(scope="module")
def batch(spark):
    return {
        "lineitem": synth_data.lineitem(spark, sf=SF),
        "orders": synth_data.orders(spark, sf=SF),
        "customer": synth_data.customer(spark, sf=SF),
    }


@pytest.fixture(scope="module")
def stream_lineitem(spark, batch, tmp_path_factory):
    d = tmp_path_factory.mktemp("li_stream")
    batch["lineitem"].write.parquet(str(d / "in"))
    return spark.readStream.schema(batch["lineitem"].schema).parquet(str(d / "in"))


@pytest.fixture(scope="module")
def backend():
    return build_backend()


def run_to_memory(spark, sdf, name, mode):
    q = (
        sdf.writeStream.format("memory")
        .queryName(name)
        .outputMode(mode)
        .start()
    )
    try:
        q.processAllAvailable()
        return spark.table(name).collect()
    finally:
        q.stop()


class TestStreamingQ6:
    def test_pipeline_composes_on_streaming_input(self, stream_lineitem, backend):
        out = backend.run("tpch", "q6", {"lineitem": stream_lineitem})
        assert out["revenue"].isStreaming

    def test_streaming_result_equals_batch(self, spark, batch, stream_lineitem, backend):
        out = backend.run("tpch", "q6", {"lineitem": stream_lineitem})
        rows = run_to_memory(spark, out["revenue"], "q6_stream", "complete")
        batch_rev = q6_hand_written(batch["lineitem"]).collect()[0]["revenue"]
        assert rows[0]["revenue"] == pytest.approx(batch_rev)

    def test_contracts_checked_on_streaming_schema(self, stream_lineitem, backend):
        from repro.spark_backend.schema import SchemaMismatch

        with pytest.raises(SchemaMismatch):
            backend.run("tpch", "q6", {"lineitem": stream_lineitem.drop("l_tax")})


class TestStreamingQ3:
    def test_stream_static_join_pipeline(self, spark, batch, stream_lineitem, backend):
        # Streaming lineitem joined against static orders/customer —
        # the composition doesn't care which inputs are streaming.
        out = backend.run(
            "tpch",
            "q3",
            {
                "lineitem": stream_lineitem,
                "orders": batch["orders"],
                "customer": batch["customer"],
            },
        )
        assert out["result"].isStreaming
        rows = run_to_memory(spark, out["result"], "q3_stream", "complete")
        from repro.spark_backend.tpch_demo import q3_hand_written

        batch_rows = q3_hand_written(
            batch["lineitem"], batch["orders"], batch["customer"]
        ).collect()
        key = lambda r: (r["l_orderkey"], r["o_orderdate"])
        assert sorted(map(key, rows)) == sorted(map(key, batch_rows))


class TestIncrementalArrival:
    def test_new_files_update_the_aggregate(self, spark, batch, backend, tmp_path_factory):
        d = tmp_path_factory.mktemp("incr")
        half = batch["lineitem"].limit(batch["lineitem"].count() // 2)
        half.write.parquet(str(d / "in"))
        sdf = spark.readStream.schema(batch["lineitem"].schema).parquet(str(d / "in"))
        out = backend.run("tpch", "q6", {"lineitem": sdf})
        q = (
            out["revenue"].writeStream.format("memory")
            .queryName("q6_incr")
            .outputMode("complete")
            .start()
        )
        try:
            q.processAllAvailable()
            first = spark.table("q6_incr").collect()[0]["revenue"] or 0.0
            # A second micro-batch arrives.
            batch["lineitem"].write.mode("append").parquet(str(d / "in"))
            q.processAllAvailable()
            second = spark.table("q6_incr").collect()[0]["revenue"] or 0.0
            assert second > first > 0
        finally:
            q.stop()
