"""Project container and whole-project validation.

A *Project* holds namespaces; its primary output is the set of Streamlet
declarations (the "all streamlets" query, Section 7.1). Validation
enforces the connection rules of Sections 4.2.2 and 5.1:

* both ports of a connection must have **identical** logical types —
  including complexity — and belong to the same clock domain (after the
  instance's domain mapping);
* each connection must have exactly one side that *drives* forward
  physical streams inside the architecture (an instance ``out`` port or
  an enclosing ``in`` port) and one that *accepts* them (instance ``in``
  / enclosing ``out``);
* every port of every instance and of the enclosing Streamlet must be
  connected **exactly once** — no dangling ports (the Tydi spec requires
  a default signal for omitted signals, which the IR does not model),
  and no one-to-many / many-to-one connections (handshake signals have
  no universal combining rule, Section 5.1).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, Iterator, List, Tuple

from .ir import (
    Connection,
    Instance,
    Interface,
    IRError,
    LinkImplementation,
    Port,
    PortMode,
    PortRef,
    Streamlet,
    StructuralImplementation,
    Namespace,
)
from .types import compatible


@dataclass
class Project:
    """A set of namespaces making up one IR project."""

    name: str = "project"
    namespaces: Dict[str, Namespace] = field(default_factory=dict)

    def add_namespace(self, ns: Namespace) -> Namespace:
        if ns.name in self.namespaces:
            raise IRError(f"duplicate namespace {ns.name!r}")
        self.namespaces[ns.name] = ns
        return ns

    def namespace(self, name: str) -> Namespace:
        try:
            return self.namespaces[name]
        except KeyError:
            raise IRError(f"no namespace {name!r} in project {self.name!r}") from None

    def all_streamlets(self) -> List[Tuple[str, str, Streamlet]]:
        """The primary output of the query system: every Streamlet
        declaration as (namespace, name, streamlet), in declaration
        order (Section 7.1)."""
        return [
            (ns.name, name, s)
            for ns in self.namespaces.values()
            for name, s in ns.streamlets.items()
        ]

    def resolve_streamlet(self, ref: str, current_ns: str) -> Streamlet:
        """Resolve a Streamlet reference: either a bare identifier in
        the current namespace, or a fully qualified ``ns::path::name``."""
        if "::" in ref:
            ns_name, _, name = ref.rpartition("::")
            ns = self.namespace(ns_name)
        else:
            ns, name = self.namespace(current_ns), ref
        try:
            return ns.streamlets[name]
        except KeyError:
            raise IRError(f"no streamlet {ref!r} (from namespace {current_ns!r})") from None

    # -- validation ------------------------------------------------------

    def validate(self) -> None:
        """Validate every structural implementation in the project."""
        for ns_name, name, s in self.all_streamlets():
            if isinstance(s.implementation, StructuralImplementation):
                self.validate_structural(ns_name, name)

    def validate_structural(self, ns_name: str, streamlet_name: str) -> None:
        ns = self.namespace(ns_name)
        outer = ns.streamlets[streamlet_name]
        impl = outer.implementation
        if not isinstance(impl, StructuralImplementation):
            raise IRError(f"{streamlet_name!r} has no structural implementation")

        where = f"{ns_name}::{streamlet_name}"
        resolved: Dict[str, Streamlet] = {
            inst.name: self.resolve_streamlet(inst.streamlet, ns_name)
            for inst in impl.instances
        }
        # Domain maps must target declared domains on both sides.
        for inst in impl.instances:
            inner_domains = set(resolved[inst.name].interface.domain_names)
            outer_domains = set(outer.interface.domain_names)
            for inst_d, parent_d in inst.domain_map:
                if inst_d not in inner_domains:
                    raise IRError(
                        f"{where}: instance {inst.name!r} maps unknown domain {inst_d!r}"
                    )
                if parent_d not in outer_domains:
                    raise IRError(
                        f"{where}: instance {inst.name!r} maps to unknown parent domain {parent_d!r}"
                    )

        def resolve_ref(ref: PortRef) -> Tuple[Port, str, bool]:
            """Return (port, effective parent domain, is_instance)."""
            if ref.instance is None:
                try:
                    p = outer.interface.port(ref.port)
                except KeyError:
                    raise IRError(f"{where}: no port {ref.port!r} on enclosing streamlet") from None
                return p, p.domain, False
            if ref.instance not in resolved:
                raise IRError(f"{where}: no instance {ref.instance!r}")
            inst = impl.instance(ref.instance)
            try:
                p = resolved[ref.instance].interface.port(ref.port)
            except KeyError:
                raise IRError(f"{where}: no port {ref.port!r} on instance {ref.instance!r}") from None
            return p, inst.parent_domain(p.domain), True

        seen: Dict[PortRef, int] = {}
        for conn in impl.connections:
            pa, dom_a, inst_a = resolve_ref(conn.a)
            pb, dom_b, inst_b = resolve_ref(conn.b)
            if not compatible(pa.typ, pb.typ):
                raise IRError(
                    f"{where}: connection {conn.a} -- {conn.b} has incompatible types"
                )
            if dom_a != dom_b:
                raise IRError(
                    f"{where}: connection {conn.a} -- {conn.b} crosses clock domains "
                    f"({dom_a!r} vs {dom_b!r})"
                )
            # Inside the architecture, forward physical streams are
            # driven by instance outputs and by the enclosing
            # streamlet's inputs.
            drives_a = (pa.mode is PortMode.OUT) == inst_a
            drives_b = (pb.mode is PortMode.OUT) == inst_b
            if drives_a == drives_b:
                raise IRError(
                    f"{where}: connection {conn.a} -- {conn.b} has "
                    f"{'two drivers' if drives_a else 'no driver'}"
                )
            for ref in (conn.a, conn.b):
                seen[ref] = seen.get(ref, 0) + 1

        # Exactly-once connectivity for every port on every side.
        def expect_once(ref: PortRef) -> None:
            n = seen.get(ref, 0)
            if n == 0:
                raise IRError(f"{where}: port {ref} is unconnected")
            if n > 1:
                raise IRError(f"{where}: port {ref} is connected {n} times (exactly one required)")

        for p in outer.interface.ports:
            expect_once(PortRef(None, p.name))
        for inst in impl.instances:
            for p in resolved[inst.name].interface.ports:
                expect_once(PortRef(inst.name, p.name))
