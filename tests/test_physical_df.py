"""Spark-parallel physical-stream pack/unpack (repro.spark_backend.physical_df)."""
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.oracle import assert_equivalent
from repro.sim import serialize
from repro.spark_backend.physical_df import pack, sequences_to_elements, unpack


@pytest.fixture(scope="module")
def elements(spark):
    # 40 sequences of varying length, as (seq, pos, value) rows.
    rows = []
    for s in range(40):
        for p in range(s % 7 + 1):
            rows.append((s, p, s * 100 + p))
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["seq", "pos", "value"])
    )


class TestPack:
    def test_c1_contract(self, elements):
        transfers = pack(elements, lanes=4).collect()
        for t in transfers:
            active = sum(t["strb"])
            # Alignment: actives fill lanes 0..active-1 (C=1).
            assert t["strb"] == [i < active for i in range(4)]
            if not t["last"]:
                assert active == 4  # full unless closing

    def test_last_per_sequence(self, elements, spark):
        transfers = pack(elements, lanes=4)
        per_seq = transfers.groupBy("seq").agg(
            F.sum(F.col("last").cast("long")).alias("n_last")
        )
        assert all(r["n_last"] == 1 for r in per_seq.collect())

    def test_matches_cycle_level_simulator(self, elements):
        # The Spark pack of one sequence equals the sim serializer's
        # C=1 trace for the same data.
        seq3 = [r["value"] for r in elements.where("seq = 3").orderBy("pos").collect()]
        trace = serialize([seq3], lanes=4, dimensionality=1, complexity=1)
        spark_rows = (
            pack(elements.where("seq = 3"), lanes=4).orderBy("cycle").collect()
        )
        assert len(spark_rows) == len(trace)
        for row, t in zip(spark_rows, trace):
            assert tuple(row["lanes"]) == t.lanes
            assert tuple(row["strb"]) == t.strb
            assert row["last"] == t.last[0]


class TestRoundTrip:
    @pytest.mark.parametrize("lanes", [1, 3, 8])
    def test_unpack_inverts_pack(self, elements, lanes):
        back = unpack(pack(elements, lanes=lanes))
        assert_equivalent(
            back,
            "SELECT seq, pos, value FROM elements",
            elements=elements,
        )

    def test_values_preserved_exactly(self, elements):
        orig = sorted(
            (r["seq"], r["pos"], r["value"]) for r in elements.collect()
        )
        back = sorted(
            (r["seq"], r["pos"], r["value"])
            for r in unpack(pack(elements, lanes=5)).collect()
        )
        assert orig == back


class TestSequencesHelper:
    def test_explode_shape(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"id": [1, 2], "chars": [[10, 20, 30], [40]]})
        )
        out = sequences_to_elements(df, id_col="id", value_col="chars").collect()
        assert sorted((r["seq"], r["pos"], r["value"]) for r in out) == [
            (1, 0, 10),
            (1, 1, 20),
            (1, 2, 30),
            (2, 0, 40),
        ]
