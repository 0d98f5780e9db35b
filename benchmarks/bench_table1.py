"""Benchmark + regeneration harness for Table 1 (paper Section 8.3).

``pytest benchmarks/bench_table1.py --benchmark-only`` times the full
pipeline (parse TIL → query DB → VHDL emission → LoC counting) and
prints the paper-vs-measured table that EXPERIMENTS.md records.
"""
import pytest

from repro.axi.table1 import compute_table1, format_table1

EXPECTED_INTERFACE = {
    "AXI4 equiv. (TIL)": 5,
    "AXI4 equiv. (TIL, Group)": 1,
    "AXI4 equiv. (VHDL)": 28,
    "AXI4": 44,
    "AXI4-Stream equiv. (TIL)": 1,
    "AXI4-Stream equiv. (VHDL)": 8,
    "AXI4-Stream": 9,
}


def test_table1_regeneration(benchmark):
    rows = benchmark(compute_table1)
    print("\n\nTable 1: Lines of code to represent an interface")
    print(format_table1(rows))
    for r in rows:
        assert r.interface_measured == EXPECTED_INTERFACE[r.name]


def test_table1_loc_shape():
    rows = {r.name: r for r in compute_table1()}
    # Paper's headline: 1 TIL line vs 28 VHDL lines (AXI4), 1 vs 8
    # (AXI4-Stream).
    assert rows["AXI4 equiv. (TIL, Group)"].interface_measured == 1
    assert rows["AXI4 equiv. (VHDL)"].interface_measured == 28
    assert rows["AXI4-Stream equiv. (TIL)"].interface_measured == 1
    assert rows["AXI4-Stream equiv. (VHDL)"].interface_measured == 8
