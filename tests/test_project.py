"""Connection legality in structural implementations (Sections 4.2.2, 5.1)."""
import pytest

from repro.core.ir import (
    Connection,
    Instance,
    Interface,
    IRError,
    Namespace,
    Port,
    PortMode,
    PortRef,
    Streamlet,
    StructuralImplementation,
)
from repro.core.project import Project
from repro.core.types import Bits, Stream


T8 = Stream(data=Bits(8), complexity=2)
T8C3 = Stream(data=Bits(8), complexity=3)
T4 = Stream(data=Bits(4), complexity=2)


def comp(in_t=T8, out_t=T8) -> Streamlet:
    return Streamlet(
        Interface(
            (Port("i", PortMode.IN, in_t), Port("o", PortMode.OUT, out_t))
        )
    )


def project_with(connections, instances=None, outer_ports=None, extra=None):
    p = Project()
    ns = p.add_namespace(Namespace("n"))
    ns.declare_streamlet("c", comp())
    for name, s in (extra or {}).items():
        ns.declare_streamlet(name, s)
    outer = Streamlet(
        Interface(outer_ports or (Port("a", PortMode.IN, T8), Port("b", PortMode.OUT, T8))),
        StructuralImplementation(
            (Instance("u", "c"),) if instances is None else instances,
            tuple(connections),
        ),
    )
    ns.declare_streamlet("top", outer)
    return p


def conn(a_inst, a_port, b_inst, b_port):
    return Connection(PortRef(a_inst, a_port), PortRef(b_inst, b_port))


class TestLegalCompositions:
    def test_simple_chain_validates(self):
        p = project_with([conn(None, "a", "u", "i"), conn("u", "o", None, "b")])
        p.validate()

    def test_instance_to_instance(self):
        p = project_with(
            [
                conn(None, "a", "u", "i"),
                conn("u", "o", "v", "i"),
                conn("v", "o", None, "b"),
            ],
            instances=(Instance("u", "c"), Instance("v", "c")),
        )
        p.validate()

    def test_passthrough_enclosing_in_to_out(self):
        p = project_with(
            [conn(None, "a", None, "b")], instances=()
        )
        p.validate()

    def test_qualified_reference_across_namespaces(self):
        p = Project()
        lib = p.add_namespace(Namespace("lib"))
        lib.declare_streamlet("c", comp())
        ns = p.add_namespace(Namespace("n"))
        ns.declare_streamlet(
            "top",
            Streamlet(
                Interface((Port("a", PortMode.IN, T8), Port("b", PortMode.OUT, T8))),
                StructuralImplementation(
                    (Instance("u", "lib::c"),),
                    (conn(None, "a", "u", "i"), conn("u", "o", None, "b")),
                ),
            ),
        )
        p.validate()


class TestIllegalCompositions:
    def test_type_mismatch(self):
        p = project_with(
            [conn(None, "a", "u", "i"), conn("u", "o", None, "b")],
            extra={"d": comp(T4, T4)},
            instances=(Instance("u", "d"),),
        )
        with pytest.raises(IRError, match="incompatible types"):
            p.validate()

    def test_complexity_mismatch_is_a_type_mismatch(self):
        # Section 4.2.2: Streams of ports are incompatible when their
        # complexity is not identical.
        p = project_with(
            [conn(None, "a", "u", "i"), conn("u", "o", None, "b")],
            extra={"d": comp(T8C3, T8)},
            instances=(Instance("u", "d"),),
        )
        with pytest.raises(IRError, match="incompatible types"):
            p.validate()

    def test_unconnected_port(self):
        p = project_with([conn(None, "a", "u", "i")])
        with pytest.raises(IRError, match="unconnected"):
            p.validate()

    def test_one_to_many_rejected(self):
        # Section 5.1: handshake signals have no universal combining
        # rule — each port connects exactly once.
        p = project_with(
            [
                conn(None, "a", "u", "i"),
                conn(None, "a", "v", "i"),
                conn("u", "o", None, "b"),
                conn("v", "o", None, "b"),
            ],
            instances=(Instance("u", "c"), Instance("v", "c")),
        )
        with pytest.raises(IRError, match="connected 2 times|two drivers|no driver"):
            p.validate()

    def test_two_drivers_rejected(self):
        p = project_with(
            [conn(None, "a", "u", "o"), conn("u", "i", None, "b")]
        )
        with pytest.raises(IRError, match="two drivers|no driver"):
            p.validate()

    def test_no_driver_rejected(self):
        p = project_with(
            [
                conn(None, "a", "u", "i"),
                conn("u", "o", None, "b"),
                conn("v", "i", None, "b2"),
            ],
            instances=(Instance("u", "c"), Instance("v", "c")),
            outer_ports=(
                Port("a", PortMode.IN, T8),
                Port("b", PortMode.OUT, T8),
                Port("b2", PortMode.OUT, T8),
            ),
        )
        with pytest.raises(IRError, match="no driver|unconnected"):
            p.validate()

    def test_unknown_instance_port(self):
        p = project_with([conn(None, "a", "u", "nope"), conn("u", "o", None, "b")])
        with pytest.raises(IRError, match="no port"):
            p.validate()

    def test_unknown_instance(self):
        p = project_with([conn(None, "a", "w", "i"), conn("u", "o", None, "b")])
        with pytest.raises(IRError, match="no instance"):
            p.validate()

    def test_unknown_streamlet_reference(self):
        p = project_with(
            [conn(None, "a", "u", "i"), conn("u", "o", None, "b")],
            instances=(Instance("u", "nope"),),
        )
        with pytest.raises(IRError, match="no streamlet"):
            p.validate()


class TestClockDomains:
    def _two_domain_comp(self):
        return Streamlet(
            Interface(
                (
                    Port("i", PortMode.IN, T8, domain="fast"),
                    Port("o", PortMode.OUT, T8, domain="slow"),
                ),
                domains=("fast", "slow"),
            )
        )

    def test_cross_domain_connection_rejected(self):
        # Section 4.2.1: ports belonging to different domains must not
        # be directly connected.
        p = Project()
        ns = p.add_namespace(Namespace("n"))
        ns.declare_streamlet("c", self._two_domain_comp())
        ns.declare_streamlet(
            "top",
            Streamlet(
                Interface(
                    (
                        Port("a", PortMode.IN, T8, domain="fast"),
                        Port("b", PortMode.OUT, T8, domain="fast"),
                    ),
                    domains=("fast",),
                ),
                StructuralImplementation(
                    (Instance("u", "c"),),
                    (conn(None, "a", "u", "i"), conn("u", "o", None, "b")),
                ),
            ),
        )
        with pytest.raises(IRError, match="crosses clock domains"):
            p.validate()

    def test_domain_mapping_heals_the_connection(self):
        p = Project()
        ns = p.add_namespace(Namespace("n"))
        ns.declare_streamlet("c", self._two_domain_comp())
        ns.declare_streamlet(
            "top",
            Streamlet(
                Interface(
                    (
                        Port("a", PortMode.IN, T8, domain="fast"),
                        Port("b", PortMode.OUT, T8, domain="fast"),
                    ),
                    domains=("fast",),
                ),
                StructuralImplementation(
                    (Instance("u", "c", (("slow", "fast"),)),),
                    (conn(None, "a", "u", "i"), conn("u", "o", None, "b")),
                ),
            ),
        )
        p.validate()

    def test_mapping_unknown_domain_rejected(self):
        p = Project()
        ns = p.add_namespace(Namespace("n"))
        ns.declare_streamlet("c", comp())
        ns.declare_streamlet(
            "top",
            Streamlet(
                Interface((Port("a", PortMode.IN, T8), Port("b", PortMode.OUT, T8))),
                StructuralImplementation(
                    (Instance("u", "c", (("nope", "default"),)),),
                    (conn(None, "a", "u", "i"), conn("u", "o", None, "b")),
                ),
            ),
        )
        with pytest.raises(IRError, match="unknown domain"):
            p.validate()


class TestAllStreamlets:
    def test_primary_query_output(self):
        p = project_with([conn(None, "a", "u", "i"), conn("u", "o", None, "b")])
        names = [(ns, n) for ns, n, _ in p.all_streamlets()]
        assert names == [("n", "c"), ("n", "top")]
