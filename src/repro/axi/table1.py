"""Table 1 harness: lines of code to represent an interface.

Reproduces the paper's Table 1 (Section 8.3). Each row pairs the
paper's reported number with the number measured from this
reproduction's own artifacts: the TIL sources in
:mod:`repro.axi.til_defs`, the VHDL signals emitted by
:mod:`repro.vhdl`, and the native Arm signal lists in
:mod:`repro.axi.native`.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional

from ..query.queries import TydiDB
from ..til import parse_project
from ..vhdl.loc import count_til_lines, vhdl_signal_count
from .native import axi4_signal_count, axi4_stream_signal_count
from .til_defs import (
    AXI4_GROUP_TIL,
    AXI4_STREAM_TIL,
    AXI4_TIL,
    til_interface_source,
    til_type_decl_source,
)


@dataclass(frozen=True)
class Row:
    name: str
    type_decl_paper: Optional[int]
    type_decl_measured: Optional[int]
    interface_paper: int
    interface_measured: int


def _db_for(til: str) -> TydiDB:
    db = TydiDB()
    db.load_project(parse_project(til))
    return db


def compute_table1() -> List[Row]:
    """All seven rows of Table 1, paper numbers alongside measured."""
    axi4_db = _db_for(AXI4_TIL)
    group_db = _db_for(AXI4_GROUP_TIL)
    axis_db = _db_for(AXI4_STREAM_TIL)
    return [
        Row(
            "AXI4 equiv. (TIL)",
            48,
            count_til_lines(til_type_decl_source(AXI4_TIL)),
            5,
            count_til_lines(til_interface_source(AXI4_TIL)),
        ),
        Row(
            "AXI4 equiv. (TIL, Group)",
            59,
            count_til_lines(til_type_decl_source(AXI4_GROUP_TIL)),
            1,
            count_til_lines(til_interface_source(AXI4_GROUP_TIL)),
        ),
        Row("AXI4 equiv. (VHDL)", None, None, 28, vhdl_signal_count(axi4_db, "axi", "example")),
        Row("AXI4", None, None, 44, axi4_signal_count()),
        Row(
            "AXI4-Stream equiv. (TIL)",
            15,
            count_til_lines(til_type_decl_source(AXI4_STREAM_TIL)),
            1,
            count_til_lines(til_interface_source(AXI4_STREAM_TIL)),
        ),
        Row(
            "AXI4-Stream equiv. (VHDL)",
            None,
            None,
            8,
            vhdl_signal_count(axis_db, "axi", "example"),
        ),
        Row("AXI4-Stream", None, None, 9, axi4_stream_signal_count()),
    ]


def format_table1(rows: List[Row]) -> str:
    """Render the table the way the paper prints it, with measured
    values next to the paper's."""
    out = [
        f"{'':28} {'Type Declaration':>22}  {'Interface':>16}",
        f"{'':28} {'paper':>10} {'measured':>11}  {'paper':>7} {'measured':>8}",
    ]
    for r in rows:
        td_p = "-" if r.type_decl_paper is None else f"{r.type_decl_paper}*"
        td_m = "-" if r.type_decl_measured is None else f"{r.type_decl_measured}*"
        out.append(
            f"{r.name:28} {td_p:>10} {td_m:>11}  {r.interface_paper:>7} {r.interface_measured:>8}"
        )
    return "\n".join(out)
