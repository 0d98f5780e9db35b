#!/usr/bin/env python
"""Regenerate Table 1 (paper Section 8.3): lines of code to represent
an interface, paper numbers vs this reproduction's measurements.

Usage: python jobs/table1_loc.py   (no Spark needed — pure IR/backend)
"""
from repro.axi.table1 import compute_table1, format_table1


def main() -> None:
    print("Table 1: Lines of code to represent an interface in TIL,")
    print("compared to the resulting number of signals in VHDL or for an")
    print("equivalent interface standard. (*Only required once.)\n")
    print(format_table1(compute_table1()))


if __name__ == "__main__":
    main()
