"""IR declaration rules: Interfaces, domains, Streamlets, Namespaces."""
import pytest

from repro.core.ir import (
    DEFAULT_DOMAIN,
    Instance,
    Interface,
    IRError,
    LinkImplementation,
    Namespace,
    Port,
    PortMode,
    Streamlet,
    StructuralImplementation,
)
from repro.core.types import Bits, Stream


def port(name, mode=PortMode.IN, domain=DEFAULT_DOMAIN, **kw):
    return Port(name, mode, Stream(data=Bits(8), **kw), domain=domain)


class TestPort:
    def test_port_requires_stream_type(self):
        with pytest.raises(IRError):
            Port("a", PortMode.IN, Bits(8))

    def test_port_name_validated(self):
        with pytest.raises(Exception):
            Port("not ok", PortMode.IN, Stream(data=Bits(1)))

    def test_port_documentation_is_a_property(self):
        p = Port("a", PortMode.IN, Stream(data=Bits(1)), doc="this is port documentation")
        assert p.doc == "this is port documentation"


class TestInterface:
    def test_duplicate_ports_rejected(self):
        with pytest.raises(IRError):
            Interface((port("a"), port("a")))

    def test_default_domain_created_when_none_declared(self):
        i = Interface((port("a"), port("b")))
        assert i.domain_names == (DEFAULT_DOMAIN,)

    def test_declared_domains(self):
        i = Interface(
            (port("a", domain="d1"), port("b", domain="d2")), domains=("d1", "d2")
        )
        assert i.domain_names == ("d1", "d2")

    def test_port_in_undeclared_domain_rejected(self):
        with pytest.raises(IRError):
            Interface((port("a", domain="dx"),), domains=("d1",))

    def test_default_domain_port_rejected_when_domains_declared(self):
        with pytest.raises(IRError):
            Interface((port("a"),), domains=("d1",))

    def test_duplicate_domains_rejected(self):
        with pytest.raises(IRError):
            Interface((port("a", domain="d"),), domains=("d", "d"))

    def test_port_lookup(self):
        i = Interface((port("a"), port("b")))
        assert i.port("b").name == "b"
        with pytest.raises(KeyError):
            i.port("c")


class TestStreamlet:
    def test_subset_to_interface(self):
        # Section 5: Streamlets can be subsetted to Interfaces, e.g.
        # for alternate implementations of the same component.
        iface = Interface((port("a"),))
        s = Streamlet(iface, LinkImplementation("./x"))
        assert s.subset() is iface

    def test_implementation_optional(self):
        assert Streamlet(Interface((port("a"),))).implementation is None

    def test_doc_property(self):
        s = Streamlet(Interface((port("a"),)), doc="documentation (optional)")
        assert s.doc == "documentation (optional)"


class TestStructuralImplementation:
    def test_duplicate_instances_rejected(self):
        with pytest.raises(IRError):
            StructuralImplementation(
                (Instance("i", "s"), Instance("i", "s")), ()
            )

    def test_instance_domain_map(self):
        i = Instance("i", "s", (("inner", "outer"),))
        assert i.parent_domain("inner") == "outer"
        assert i.parent_domain("other") == "other"  # identity by default


class TestNamespace:
    def test_path_names(self):
        ns = Namespace("my::example::space")
        assert ns.name == "my::example::space"

    def test_invalid_path_segment(self):
        with pytest.raises(Exception):
            Namespace("my::bad segment")

    def test_duplicate_declaration_rejected(self):
        ns = Namespace("n")
        ns.declare_type("t", Bits(1))
        with pytest.raises(IRError):
            ns.declare_type("t", Bits(2))

    def test_same_name_different_kind_allowed(self):
        # Types, interfaces, streamlets and implementations live in
        # separate tables.
        ns = Namespace("n")
        ns.declare_type("x", Bits(1))
        ns.declare_interface("x", Interface((port("a"),)))
        ns.declare_streamlet("x", Streamlet(Interface((port("a"),))))
        ns.declare_implementation("x", LinkImplementation("./p"))

    def test_declaration_order_preserved(self):
        ns = Namespace("n")
        for name in ("c", "a", "b"):
            ns.declare_streamlet(name, Streamlet(Interface((port("p"),))))
        assert list(ns.streamlets) == ["c", "a", "b"]
