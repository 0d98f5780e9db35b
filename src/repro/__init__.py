"""Reproduction of "An Intermediate Representation for Composable Typed
Streaming Dataflow Designs" (Tydi-IR / TIL, VLDB 2023) on a PySpark
substrate.

Subpackages
-----------
core
    Tydi logical types, physical-stream lowering, IR declarations.
til
    The Tydi Intermediate Language grammar and parser.
query
    Salsa-style demand-driven memoizing query database.
vhdl
    The VHDL backend (text emission, Table 1 LoC counting).
axi
    AXI4 / AXI4-Stream equivalents used by the paper's evaluation.
sim
    Cycle-level physical-stream transfer simulator (Figure 1 semantics).
tb
    Transaction-level testing syntax and runner (Section 6).
spark_backend
    Lowering of the IR to composable PySpark DataFrame operators.
"""
