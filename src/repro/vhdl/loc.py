"""Lines-of-code counters for Table 1 (paper Section 8.3).

The paper compares "lines of code to represent an interface in TIL,
compared to the resulting number of signals in VHDL or for an
equivalent interface standard":

* **TIL type declaration LoC** — non-blank, non-comment lines of the
  ``type`` declarations (marked \\* in the table: required only once,
  then reused for any number of ports);
* **TIL interface LoC** — one line per port (``name: in type`` — and a
  connection is likewise a single ``a -- b;`` expression);
* **VHDL interface LoC** — one line per emitted physical-stream signal
  (clk/rst excluded, matching Listing 4's 8 signal lines);
* **native interface LoC** — one line per signal of the equivalent
  interface standard (from :mod:`repro.axi.native`).
"""
from __future__ import annotations

from ..core.ir import PortMode
from ..query.queries import TydiDB
from .emit import signal_ports


def count_til_lines(source: str) -> int:
    """Count effective TIL source lines: non-blank lines that are not
    pure ``//`` comments (documentation lines do count — they are IR)."""
    n = 0
    for line in source.splitlines():
        stripped = line.strip()
        if not stripped or stripped.startswith("//"):
            continue
        n += 1
    return n


def til_port_count(db: TydiDB, ns: str, name: str) -> int:
    """Interface LoC in TIL: one line per port declaration."""
    return len(db.streamlet(ns, name).interface.ports)


def vhdl_signal_count(db: TydiDB, ns: str, name: str) -> int:
    """Interface LoC in VHDL: one line per emitted stream signal
    (excluding clk/rst, as in Listing 4)."""
    total = 0
    for pname, mode, phys in db.split_streams(ns, name):
        total += len(signal_ports(PortMode(mode), phys))
    return total
