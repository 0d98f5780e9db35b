"""TIL grammar/parser tests (paper Section 7.2)."""
from fractions import Fraction

import pytest

from repro.core.ir import LinkImplementation, PortMode, StructuralImplementation
from repro.core.types import Bits, Direction, Null, Stream, Synchronicity, group, union
from repro.til import ParseError, parse_project


def one_ns(src, name="n"):
    return parse_project(f"namespace {name} {{ {src} }}").namespaces[name]


class TestNamespaces:
    def test_path_namespace(self):
        p = parse_project("namespace example::name::space { }")
        assert "example::name::space" in p.namespaces

    def test_multiple_namespaces(self):
        p = parse_project("namespace a { } namespace b { }")
        assert set(p.namespaces) == {"a", "b"}

    def test_missing_keyword(self):
        with pytest.raises(ParseError):
            parse_project("names a { }")


class TestTypeExpressions:
    @pytest.mark.parametrize(
        "src,expected",
        [
            ("Null", Null()),
            ("Bits(8)", Bits(8)),
            ("Bits(54)", Bits(54)),
            ("Group(a: Bits(1), b: Null)", group(a=Bits(1), b=Null())),
            ("Union(data: Bits(8), null: Null)", union(data=Bits(8), null=Null())),
            ("Group(a: Group(b: Bits(2)))", group(a=group(b=Bits(2)))),
        ],
    )
    def test_element_types(self, src, expected):
        ns = one_ns(f"type t = {src};")
        assert ns.types["t"] == expected

    def test_stream_defaults(self):
        ns = one_ns("type t = Stream(data: Bits(8));")
        s = ns.types["t"]
        assert s == Stream(data=Bits(8))

    def test_stream_all_properties(self):
        ns = one_ns(
            "type t = Stream(data: Bits(8), throughput: 2.5, dimensionality: 2,"
            " synchronicity: FlatDesync, complexity: 7, direction: Reverse,"
            " user: Bits(3), keep: true);"
        )
        s = ns.types["t"]
        assert s.throughput == Fraction(5, 2)
        assert s.dimensionality == 2
        assert s.synchronicity is Synchronicity.FLAT_DESYNC
        assert s.complexity == 7
        assert s.direction is Direction.REVERSE
        assert s.user == Bits(3)
        assert s.keep

    def test_stream_requires_data(self):
        with pytest.raises(ParseError, match="data"):
            one_ns("type t = Stream(complexity: 2);")

    def test_type_reference(self):
        ns = one_ns("type a = Bits(4); type b = Group(x: a);")
        assert ns.types["b"] == group(x=Bits(4))

    def test_qualified_type_reference(self):
        p = parse_project(
            "namespace lib { type byte = Bits(8); }"
            "namespace n { type t = Group(b: lib::byte); }"
        )
        assert p.namespaces["n"].types["t"] == group(b=Bits(8))

    def test_unknown_type_reference(self):
        with pytest.raises(ParseError, match="unknown type"):
            one_ns("type t = Group(a: nope);")

    def test_unknown_stream_property(self):
        with pytest.raises(ParseError, match="unknown Stream property"):
            one_ns("type t = Stream(data: Bits(1), wibble: 3);")

    def test_unknown_synchronicity(self):
        with pytest.raises(ParseError, match="synchronicity"):
            one_ns("type t = Stream(data: Bits(1), synchronicity: Sometimes);")

    def test_trailing_commas_allowed(self):
        one_ns("type t = Group(a: Bits(1), b: Bits(2),);")


class TestInterfacesAndStreamlets:
    SRC = """
    type stream = Stream(data: Bits(54), complexity: 2);
    streamlet comp1 = (a: in stream, b: out stream);
    """

    def test_ports(self):
        ns = one_ns(self.SRC)
        s = ns.streamlets["comp1"]
        assert [p.name for p in s.interface.ports] == ["a", "b"]
        assert s.interface.port("a").mode is PortMode.IN
        assert s.interface.port("b").mode is PortMode.OUT

    def test_interface_declaration_and_reference(self):
        ns = one_ns(
            "type t = Stream(data: Bits(1));"
            "interface io = (a: in t, b: out t);"
            "streamlet s = io;"
        )
        assert ns.streamlets["s"].interface is ns.interfaces["io"]

    def test_streamlet_subset_to_interface(self):
        # Syntax sugar: referencing a streamlet in interface position
        # subsets it to its interface (Section 5 / 7.2).
        ns = one_ns(
            "type t = Stream(data: Bits(1));"
            "streamlet a = (x: in t, y: out t);"
            "streamlet b = a;"
        )
        assert ns.streamlets["b"].interface is ns.streamlets["a"].interface

    def test_domains(self):
        ns = one_ns(
            "type t = Stream(data: Bits(1));"
            "interface io = <'fast, 'slow>(a: in t 'fast, b: out t 'slow);"
        )
        io = ns.interfaces["io"]
        assert io.domains == ("fast", "slow")
        assert io.port("a").domain == "fast"
        assert io.port("b").domain == "slow"

    def test_bad_port_mode(self):
        with pytest.raises(ParseError, match="in.*out|port mode"):
            one_ns("type t = Stream(data: Bits(1)); streamlet s = (a: inout t);")

    def test_inline_stream_type_in_port(self):
        ns = one_ns("streamlet s = (a: in Stream(data: Bits(9)));")
        assert ns.streamlets["s"].interface.port("a").typ == Stream(data=Bits(9))


class TestDocumentation:
    def test_listing1(self):
        """The paper's Listing 1, verbatim."""
        ns = one_ns(
            """
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
            """
        )
        s = ns.streamlets["comp1"]
        assert s.doc == "documentation (optional)"
        assert s.interface.port("c").doc == "this is port\ndocumentation"
        assert s.interface.port("a").doc is None  # comments are not docs


class TestImplementations:
    def test_linked_implementation(self):
        ns = one_ns(
            "type t = Stream(data: Bits(1));"
            'streamlet s = (a: in t, b: out t) { "./path/to/directory" };'
        )
        impl = ns.streamlets["s"].implementation
        assert isinstance(impl, LinkImplementation)
        assert impl.path == "./path/to/directory"

    def test_structural_implementation(self):
        ns = one_ns(
            """
            type t = Stream(data: Bits(1));
            streamlet c = (i: in t, o: out t);
            streamlet top = (a: in t, b: out t) {
                u = c;
                a -- u.i;
                u.o -- b;
            };
            """
        )
        impl = ns.streamlets["top"].implementation
        assert isinstance(impl, StructuralImplementation)
        assert [i.name for i in impl.instances] == ["u"]
        assert len(impl.connections) == 2

    def test_named_impl_declaration_and_reference(self):
        ns = one_ns(
            """
            type t = Stream(data: Bits(1));
            streamlet c = (i: in t, o: out t);
            impl wiring = c { "./behav" };
            streamlet s = c { wiring };
            """
        )
        impl = ns.streamlets["s"].implementation
        assert isinstance(impl, LinkImplementation)
        assert impl.path == "./behav"

    def test_instance_domain_assignment(self):
        ns = one_ns(
            """
            type t = Stream(data: Bits(1));
            streamlet c = <'d1>(i: in t 'd1, o: out t 'd1);
            streamlet top = <'pd>(a: in t 'pd, b: out t 'pd) {
                u = c<'d1 = 'pd>;
                a -- u.i;
                u.o -- b;
            };
            """
        )
        impl = ns.streamlets["top"].implementation
        assert impl.instances[0].domain_map == (("d1", "pd"),)

    def test_instance_positional_domain_assignment(self):
        ns = one_ns(
            """
            type t = Stream(data: Bits(1));
            streamlet c = <'d1>(i: in t 'd1, o: out t 'd1);
            streamlet top = <'pd>(a: in t 'pd, b: out t 'pd) {
                u = c<'pd>;
                a -- u.i;
                u.o -- b;
            };
            """
        )
        impl = ns.streamlets["top"].implementation
        assert impl.instances[0].domain_map == (("d1", "pd"),)

    def test_validation_runs_by_default(self):
        with pytest.raises(Exception, match="unconnected"):
            parse_project(
                """
                namespace n {
                type t = Stream(data: Bits(1));
                streamlet c = (i: in t, o: out t);
                streamlet top = (a: in t, b: out t) {
                    u = c;
                    a -- u.i;
                };
                }
                """
            )

    def test_validation_can_be_skipped(self):
        parse_project(
            """
            namespace n {
            type t = Stream(data: Bits(1));
            streamlet c = (i: in t, o: out t);
            streamlet top = (a: in t, b: out t) { u = c; a -- u.i; };
            }
            """,
            validate=False,
        )


class TestPaperExample:
    """The running example shapes from Section 7.2 parse end-to-end."""

    def test_full_example(self):
        p = parse_project(
            """
            namespace my::example::space {
                type byte = Bits(8);
                type stream = Stream(data: byte, throughput: 2.0, dimensionality: 1,
                                     synchronicity: Sync, complexity: 4);
                #documentation#
                streamlet comp1 = (a: in stream, b: out stream);
                streamlet comp2 = comp1 { "./comp2_behav" };
                streamlet top = (q: in stream, r: out stream) {
                    one = comp1;
                    two = comp2;
                    q -- one.a;
                    one.b -- two.a;
                    two.b -- r;
                };
            }
            """
        )
        ns = p.namespaces["my::example::space"]
        assert set(ns.streamlets) == {"comp1", "comp2", "top"}
        assert ns.streamlets["comp1"].doc == "documentation"
