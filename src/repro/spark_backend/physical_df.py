"""Physical-stream traces as Spark DataFrames: data-parallel pack/unpack.

The transfer simulator in :mod:`repro.sim` is cycle-accurate but
single-threaded; this module scales the same C=1 organisation (Figure 1
left) to SF-sized data with pure DataFrame transformations:

* :func:`pack` — elements ``(seq, pos, value)`` → transfers
  ``(seq, cycle, lanes, strb, last)``: innermost sequences are chunked
  into full transfers of N lanes (the final transfer of each sequence
  may be partial), exactly the C=1 contract;
* :func:`unpack` — the inverse, via ``posexplode`` over the lanes.

Both are shuffle-bearing Spark jobs (window over sequence extents,
group by transfer index), so the benchmark exercises a genuine
distributed serialization path rather than a driver-side loop.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window


def pack(elements: DataFrame, *, lanes: int) -> DataFrame:
    """Pack ``(seq, pos, value)`` rows into C=1 transfers.

    ``seq`` identifies the innermost sequence (dimensionality 1),
    ``pos`` the element's position within it. Returns
    ``(seq, cycle, lanes, strb, last)`` where ``lanes`` is an
    N-element array (NULL-padded), ``strb`` the per-lane activity mask
    and ``last`` the per-transfer last flag — one transfer per row, in
    (seq, cycle) order.
    """
    n = lanes
    w = Window.partitionBy("seq")
    with_len = elements.withColumn("seq_len", F.max("pos").over(w) + 1)
    chunked = with_len.withColumn("cycle", (F.col("pos") / n).cast("long")).withColumn(
        "lane", F.col("pos") % n
    )
    grouped = (
        chunked.groupBy("seq", "cycle")
        .agg(
            F.sort_array(F.collect_list(F.struct("lane", "value"))).alias("elems"),
            F.max("seq_len").alias("seq_len"),
        )
        .withColumn("n_active", F.size("elems"))
    )
    lane_cols = [
        F.when(i < F.col("n_active"), F.col("elems")[i]["value"]).alias(f"_l{i}")
        for i in range(n)
    ]
    strb_cols = [(i < F.col("n_active")).alias(f"_s{i}") for i in range(n)]
    return (
        grouped.select(
            "seq",
            "cycle",
            F.array(*lane_cols).alias("lanes"),
            F.array(*strb_cols).alias("strb"),
            ((F.col("cycle") + 1) * n >= F.col("seq_len")).alias("last"),
        )
        .orderBy("seq", "cycle")
    )


def unpack(transfers: DataFrame) -> DataFrame:
    """Inverse of :func:`pack`: transfers back to ``(seq, pos, value)``
    element rows (active lanes only)."""
    n_expr = F.size("lanes")
    return (
        transfers.select(
            "seq",
            "cycle",
            n_expr.alias("n"),
            F.posexplode(F.arrays_zip("lanes", "strb")).alias("lane", "z"),
        )
        .where(F.col("z")["strb"])
        .select(
            "seq",
            (F.col("cycle") * F.col("n") + F.col("lane")).alias("pos"),
            F.col("z")["lanes"].alias("value"),
        )
    )


def sequences_to_elements(seqs: DataFrame, *, id_col: str, value_col: str) -> DataFrame:
    """Helper: explode a DataFrame of array-valued sequences into the
    ``(seq, pos, value)`` shape :func:`pack` consumes."""
    return seqs.select(
        F.col(id_col).alias("seq"),
        F.posexplode(F.col(value_col)).alias("pos", "value"),
    )
