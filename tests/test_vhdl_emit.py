"""VHDL backend tests (paper Section 7.3, Listings 2 and 4)."""
import pytest

from repro.query.queries import TydiDB
from repro.til import parse_project
from repro.vhdl import emit_project, register_vhdl_queries
from repro.vhdl.emit import component_name, signal_ports
from repro.core.ir import PortMode
from repro.core.lower import split_stream
from repro.core.types import Bits, Direction, Stream


def db_for(src) -> TydiDB:
    d = TydiDB()
    d.load_project(parse_project(src))
    return register_vhdl_queries(d)


LISTING1 = """
namespace my::example::space {
    type stream = Stream(data: Bits(54), complexity: 2);
    type stream2 = Stream(data: Bits(54), complexity: 2);
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


class TestListing2:
    """Documentation from Listing 1 propagating to VHDL (Listing 2)."""

    @pytest.fixture()
    def comp(self):
        return db_for(LISTING1).query("vhdl_component", "my::example::space", "comp1")

    def test_component_name(self, comp):
        assert "component my__example__space__comp1_com" in comp

    def test_streamlet_doc_becomes_comment(self, comp):
        assert comp.splitlines()[0] == "-- documentation (optional)"

    def test_port_doc_becomes_comment_lines(self, comp):
        lines = [l.strip() for l in comp.splitlines()]
        i = lines.index("-- this is port")
        assert lines[i + 1] == "-- documentation"
        # Preceding its subject: next signal line is c's valid.
        assert lines[i + 2].startswith("c_valid")

    def test_comments_are_not_emitted(self, comp):
        assert "This is a comment" not in comp

    def test_clock_and_reset(self, comp):
        assert "clk : in std_logic;" in comp
        assert "rst : in std_logic;" in comp

    def test_signal_shapes(self, comp):
        assert "a_valid : in std_logic;" in comp
        assert "a_ready : out std_logic;" in comp
        assert "a_data : in std_logic_vector(53 downto 0);" in comp
        assert "b_valid : out std_logic;" in comp
        assert "b_ready : in std_logic;" in comp
        assert "b_data : out std_logic_vector(53 downto 0);" in comp
        assert "d_data : out std_logic_vector(53 downto 0)" in comp


class TestSignalDirections:
    def test_in_port_forward_stream(self):
        [ps] = split_stream("a", Stream(data=Bits(8)))
        sigs = signal_ports(PortMode.IN, (ps,))
        assert ("a_valid", "in", 1) in sigs
        assert ("a_ready", "out", 1) in sigs
        assert ("a_data", "in", 8) in sigs

    def test_out_port_mirrors(self):
        [ps] = split_stream("a", Stream(data=Bits(8)))
        sigs = signal_ports(PortMode.OUT, (ps,))
        assert ("a_valid", "out", 1) in sigs
        assert ("a_ready", "in", 1) in sigs

    def test_reverse_stream_flips(self):
        [ps] = split_stream("a", Stream(data=Bits(8), direction=Direction.REVERSE))
        sigs = signal_ports(PortMode.IN, (ps,))
        assert ("a_valid", "out", 1) in sigs
        assert ("a_ready", "in", 1) in sigs


class TestArchitectures:
    BASE = """
    namespace n {
        type t = Stream(data: Bits(8), complexity: 2);
        streamlet empty = (i: in t, o: out t);
        streamlet linked = (i: in t, o: out t) { "./behav" };
        streamlet top = (a: in t, b: out t) {
            u = empty;
            v = linked;
            a -- u.i;
            u.o -- v.i;
            v.o -- b;
        };
    }
    """

    def test_no_impl_empty_architecture(self):
        arch = db_for(self.BASE).query("vhdl_architecture", "n", "empty")
        assert "architecture Behavioral of n__empty_com" in arch
        assert arch.strip().endswith("end Behavioral;")

    def test_linked_template_generated_when_file_missing(self):
        arch = db_for(self.BASE).query("vhdl_architecture", "n", "linked")
        assert "linked implementation: ./behav" in arch
        assert "architecture Behavioral" in arch

    def test_linked_file_imported_when_present(self):
        d = db_for(self.BASE)
        d.set_input("linked_file", "./behav/linked.vhd", "-- custom architecture body")
        arch = d.query("vhdl_architecture", "n", "linked")
        assert arch == "-- custom architecture body"

    def test_structural_architecture(self):
        arch = db_for(self.BASE).query("vhdl_architecture", "n", "top")
        assert "architecture Structural of n__top_com" in arch
        assert "u: n__empty_com" in arch
        assert "v: n__linked_com" in arch
        # Instance-to-instance connection gets a wire signal.
        assert "signal conn_" in arch
        # Enclosing-port connections map directly onto the port names.
        assert "i_valid => a_valid" in arch.replace("      ", " ").replace("  ", " ") or "i_valid => a_valid" in arch

    def test_whole_project_emission(self):
        text = emit_project(db_for(self.BASE))
        assert "package proj_pkg is" in text
        for name in ("empty", "linked", "top"):
            assert component_name("n", name) in text

    def test_emission_is_memoized(self):
        d = db_for(self.BASE)
        emit_project(d)
        d.stats.reset()
        emit_project(d)
        assert d.stats.recomputes == 0


class TestListing4:
    def test_axi4_stream_signals(self):
        from repro.axi.til_defs import AXI4_STREAM_TIL

        d = db_for(AXI4_STREAM_TIL)
        comp = d.query("vhdl_component", "axi", "example")
        expected = [
            "axi4stream_valid : in std_logic;",
            "axi4stream_ready : out std_logic;",
            "axi4stream_data : in std_logic_vector(1151 downto 0);",
            "axi4stream_last : in std_logic;",
            "axi4stream_stai : in std_logic_vector(6 downto 0);",
            "axi4stream_endi : in std_logic_vector(6 downto 0);",
            "axi4stream_strb : in std_logic_vector(127 downto 0);",
            "axi4stream_user : in std_logic_vector(12 downto 0)",
        ]
        lines = [l.strip() for l in comp.splitlines()]
        for e in expected:
            assert e in lines, f"missing {e}"
