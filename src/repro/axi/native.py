"""Native AXI4 and AXI4-Stream signal lists.

Transcribed from the Arm AMBA specifications the paper cites ([4] AXI4-
Stream, [5] AXI4). Table 1's bottom reference rows count one line per
interface signal; global clock/reset (ACLK/ARESETn) are excluded, as in
the paper's Tydi-side counts (Listing 4 shows 8 stream signals, clk/rst
aside).

AXI4: 44 signals over five channels (the paper's "44"):
13 (AW) + 6 (W) + 5 (B) + 13 (AR) + 7 (R).
AXI4-Stream: 9 signals (the paper's "9").
"""
from typing import Dict, Tuple

#: AXI4 write/read channels, per Arm IHI 0022 (AXI4 removed WID).
AXI4_SIGNALS: Dict[str, Tuple[str, ...]] = {
    "aw": (
        "AWID", "AWADDR", "AWLEN", "AWSIZE", "AWBURST", "AWLOCK",
        "AWCACHE", "AWPROT", "AWQOS", "AWREGION", "AWUSER",
        "AWVALID", "AWREADY",
    ),
    "w": ("WDATA", "WSTRB", "WLAST", "WUSER", "WVALID", "WREADY"),
    "b": ("BID", "BRESP", "BUSER", "BVALID", "BREADY"),
    "ar": (
        "ARID", "ARADDR", "ARLEN", "ARSIZE", "ARBURST", "ARLOCK",
        "ARCACHE", "ARPROT", "ARQOS", "ARREGION", "ARUSER",
        "ARVALID", "ARREADY",
    ),
    "r": ("RID", "RDATA", "RRESP", "RLAST", "RUSER", "RVALID", "RREADY"),
}

#: AXI4-Stream, per Arm IHI 0051.
AXI4_STREAM_SIGNALS: Tuple[str, ...] = (
    "TVALID", "TREADY", "TDATA", "TSTRB", "TKEEP", "TLAST",
    "TID", "TDEST", "TUSER",
)


def axi4_signal_count() -> int:
    return sum(len(v) for v in AXI4_SIGNALS.values())


def axi4_stream_signal_count() -> int:
    return len(AXI4_STREAM_SIGNALS)
