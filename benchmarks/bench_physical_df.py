"""Spark-parallel physical-stream serialization at scale: pack/unpack
of ~600k elements into C=1 transfers on N lanes."""
import pytest
import pyspark.sql.functions as F

from repro import synth_data
from repro.spark_backend.physical_df import pack, unpack

N_ELEMENTS = 600_000
N_SEQS = 40_000


@pytest.fixture(scope="module")
def elements(spark):
    # Zipf-keyed values grouped into sequences: (seq, pos, value).
    df = synth_data.zipf_keys(spark, n=N_ELEMENTS, n_keys=N_SEQS, alpha=1.1)
    from pyspark.sql import Window

    w = Window.partitionBy("k").orderBy("v")
    e = (
        df.withColumn("pos", F.row_number().over(w) - 1)
        .select(F.col("k").alias("seq"), "pos", F.col("v").alias("value"))
        .cache()
    )
    e.count()
    return e


@pytest.mark.benchmark(group="physical-df")
@pytest.mark.parametrize("lanes", [4, 16])
def test_pack(benchmark, elements, lanes):
    def run():
        return pack(elements, lanes=lanes).count()

    n_transfers = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n_transfers >= N_SEQS  # at least one transfer per sequence


@pytest.mark.benchmark(group="physical-df")
def test_pack_unpack_round_trip(benchmark, elements):
    def run():
        return unpack(pack(elements, lanes=8)).count()

    n = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert n == N_ELEMENTS
