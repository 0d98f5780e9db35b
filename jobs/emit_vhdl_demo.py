#!/usr/bin/env python
"""Emit the paper's running example (Listings 1-4) as VHDL.

Parses a TIL project containing Listing 1's documented streamlet and
Listing 3's AXI4-Stream equivalent, then prints the full VHDL emission
(package + entities + architectures), demonstrating documentation
propagation (Listing 2) and the physical-stream signal derivation
(Listing 4).

Usage: python jobs/emit_vhdl_demo.py
"""
from repro.axi.til_defs import AXI4_STREAM_TIL
from repro.query.queries import TydiDB
from repro.til import parse_project
from repro.vhdl import emit_project, register_vhdl_queries

LISTING1 = """
namespace my::example::space {
    type stream = Stream(data: Bits(54), throughput: 2.0, dimensionality: 0,
                         synchronicity: Sync, complexity: 4);
    type stream2 = Stream(data: Bits(54), complexity: 4);
    #documentation (optional)#
    streamlet comp1 = (
        // This is a comment
        a: in stream,
        b: out stream,
        #this is port
documentation#
        c: in stream2,
        d: out stream2,
    );
}
"""


def main() -> None:
    for name, src in (("Listing 1 example", LISTING1), ("AXI4-Stream (Listing 3)", AXI4_STREAM_TIL)):
        db = register_vhdl_queries(TydiDB())
        db.load_project(parse_project(src))
        print(f"-- ======== {name} ========")
        print(emit_project(db))


if __name__ == "__main__":
    main()
