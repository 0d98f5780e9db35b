"""TIL sources for the Tydi equivalents of AXI4-Stream and AXI4.

These are the artifacts Table 1 counts (paper Section 8.3):

* ``AXI4_STREAM_TIL`` — the paper's Listing 3: one Stream with 128
  byte lanes, per-byte strobe modeled as ``Union(data, null)``
  (equivalent to TSTRB), dimensionality 1 (TLAST), complexity 7
  (Tydi's strobe is equivalent to TKEEP), and TID/TDEST/TUSER on the
  ``user`` signal;
* ``AXI4_TIL`` — a Stream per channel (Address Write, Write Data,
  Write Response, Address Read, Read Data), split across 5 ports.
  Write/read address channels share one Stream type — type identifiers
  are not type properties, so structural reuse is free (§4.2.2).
  Data channels use 4 byte lanes (a 32-bit bus) so Tydi's strobe
  mirrors WSTRB per byte;
* ``AXI4_GROUP_TIL`` — the same five channels combined into a single
  Group with ``Reverse`` Streams for the Read Data and Write Response
  channels, usable as one port. Both forms result in identical
  physical streams.

Formatting follows the paper's one-property-per-line style, since
Table 1 counts source lines.
"""

AXI4_STREAM_TIL = """\
namespace axi {
type axi4stream = Stream (
    data: Union (
        data: Bits(8),
        null: Null, // Equivalent to TSTRB
    ),
    throughput: 128.0, // Data bus width
    dimensionality: 1, // Equivalent to TLAST
    synchronicity: Sync,
    complexity: 7, // Tydi's strobe is equivalent to TKEEP
    user: Group (
        TID: Bits(8),
        TDEST: Bits(4),
        TUSER: Bits(1),
    ),
);
streamlet example = (
    axi4stream: in axi4stream,
);
}
"""

#: The five-channel AXI4 equivalent, one port per channel.
AXI4_TIL = """\
namespace axi {
// Write and read address channels share one Stream type.
type axi4_addr = Stream (
    data: Group (
        addr: Bits(32),
        len: Bits(8),
        size: Bits(3),
        burst: Bits(2),
        lock: Bits(1),
        cache: Bits(4),
        prot: Bits(3),
        qos: Bits(4),
        region: Bits(4),
    ),
    complexity: 2,
    user: Group (
        id: Bits(4),
        user: Bits(1),
    ),
);
type axi4_wdata = Stream (
    data: Union (
        data: Bits(8),
        null: Null, // Equivalent to WSTRB
    ),
    throughput: 4.0, // Data bus width in bytes
    dimensionality: 1, // Equivalent to WLAST
    complexity: 7,
    user: Bits(1), // WUSER
);
type axi4_resp = Stream (
    data: Bits(2), // BRESP
    complexity: 2,
    user: Group (
        id: Bits(4),
        user: Bits(1),
    ),
);
type axi4_rdata = Stream (
    data: Group (
        data: Bits(8),
        resp: Bits(2),
    ),
    throughput: 4.0, // Data bus width in bytes
    dimensionality: 1, // Equivalent to RLAST
    complexity: 7,
    user: Group (
        id: Bits(4),
        user: Bits(1),
    ),
);
streamlet example = (
    aw: in axi4_addr,
    w: in axi4_wdata,
    b: out axi4_resp,
    ar: in axi4_addr,
    r: out axi4_rdata,
);
}
"""

#: The single-port Group form: Write Response and Read Data become
#: Reverse Streams inside one Group carried by one port.
AXI4_GROUP_TIL = """\
namespace axi {
type axi4_addr = Stream (
    data: Group (
        addr: Bits(32),
        len: Bits(8),
        size: Bits(3),
        burst: Bits(2),
        lock: Bits(1),
        cache: Bits(4),
        prot: Bits(3),
        qos: Bits(4),
        region: Bits(4),
    ),
    complexity: 2,
    user: Group (
        id: Bits(4),
        user: Bits(1),
    ),
);
type axi4_wdata = Stream (
    data: Union (
        data: Bits(8),
        null: Null, // Equivalent to WSTRB
    ),
    throughput: 4.0, // Data bus width in bytes
    dimensionality: 1, // Equivalent to WLAST
    complexity: 7,
    user: Bits(1), // WUSER
);
type axi4_resp_rev = Stream (
    data: Bits(2), // BRESP
    complexity: 2,
    direction: Reverse,
    user: Group (
        id: Bits(4),
        user: Bits(1),
    ),
);
type axi4_rdata_rev = Stream (
    data: Group (
        data: Bits(8),
        resp: Bits(2),
    ),
    throughput: 4.0, // Data bus width in bytes
    dimensionality: 1, // Equivalent to RLAST
    complexity: 7,
    direction: Reverse,
    user: Group (
        id: Bits(4),
        user: Bits(1),
    ),
);
type axi4 = Stream (
    data: Group (
        aw: axi4_addr,
        w: axi4_wdata,
        b: axi4_resp_rev,
        ar: axi4_addr,
        r: axi4_rdata_rev,
    ),
);
streamlet example = (
    axi4: in axi4,
);
}
"""


def til_type_decl_source(til: str) -> str:
    """The ``type`` declaration lines of one of the sources above (for
    Table 1's "Type Declaration" column). Everything between the
    namespace header and the first ``streamlet`` line."""
    lines = til.splitlines()
    start = next(i for i, l in enumerate(lines) if l.startswith("type "))
    end = next(i for i, l in enumerate(lines) if l.startswith("streamlet "))
    return "\n".join(lines[start:end])


def til_interface_source(til: str) -> str:
    """The port declaration lines (Table 1's "Interface" column)."""
    lines = til.splitlines()
    start = next(i for i, l in enumerate(lines) if l.startswith("streamlet "))
    end = next(i for i in range(start + 1, len(lines)) if lines[i].startswith(");"))
    return "\n".join(lines[start + 1 : end])
