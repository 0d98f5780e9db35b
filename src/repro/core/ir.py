"""IR declarations: Interfaces, Streamlets, Implementations, Namespaces.

Paper Sections 4.2 and 5. An *Interface* is a collection of ports (each
carrying a logical Stream in or out) plus named clock/reset *domains*;
ports and interfaces may carry *documentation*, an actual IR property
(not a comment) that backends are expected to propagate. A *Streamlet*
is an Interface plus an optional *Implementation* — either a *link* to
behaviour expressed in a target language, or a *structural*
implementation composing Streamlet instances with connections.

Connection legality (Sections 4.2.2 and 5.1) is enforced in
:mod:`repro.core.project`, which has the namespace context needed to
resolve Streamlet references.
"""
from __future__ import annotations

import enum
from dataclasses import dataclass, field
from typing import Optional, Tuple

from .types import Stream, TypeError_, _check_ident

#: Tydi currently only defines Streams in the context of a clock, so an
#: Interface without explicit domains gets this default domain assigned
#: to all of its ports (Section 4.2.1).
DEFAULT_DOMAIN = "default"


class IRError(ValueError):
    """Raised when an IR declaration violates the rules the IR codifies."""


class PortMode(enum.Enum):
    IN = "in"
    OUT = "out"


@dataclass(frozen=True)
class Port:
    """A named port carrying a logical Stream into or out of a
    Streamlet, associated with one clock/reset domain."""

    name: str
    mode: PortMode
    typ: Stream
    domain: str = DEFAULT_DOMAIN
    doc: Optional[str] = None

    def __post_init__(self) -> None:
        _check_ident(self.name, "port name")
        if not isinstance(self.typ, Stream):
            raise IRError(f"port {self.name!r} must carry a Stream type")


@dataclass(frozen=True)
class Interface:
    """A collection of ports and the clock/reset domains they belong to.

    ``domains`` lists the uniquely named domains; when empty, the
    default domain is created and assigned (all ports must then use
    :data:`DEFAULT_DOMAIN`). Ports belonging to different domains must
    not be directly connected.
    """

    ports: Tuple[Port, ...]
    domains: Tuple[str, ...] = ()
    doc: Optional[str] = None

    def __post_init__(self) -> None:
        names = [p.name for p in self.ports]
        if len(set(names)) != len(names):
            raise IRError(f"interface has duplicate port names: {names}")
        if len(set(self.domains)) != len(self.domains):
            raise IRError(f"interface has duplicate domain names: {self.domains}")
        valid = set(self.domains) if self.domains else {DEFAULT_DOMAIN}
        for p in self.ports:
            if p.domain not in valid:
                raise IRError(
                    f"port {p.name!r} uses undeclared domain {p.domain!r} "
                    f"(declared: {sorted(valid)})"
                )

    @property
    def domain_names(self) -> Tuple[str, ...]:
        return self.domains if self.domains else (DEFAULT_DOMAIN,)

    def port(self, name: str) -> Port:
        for p in self.ports:
            if p.name == name:
                return p
        raise KeyError(f"no port {name!r}")


@dataclass(frozen=True)
class LinkImplementation:
    """A *link* to an implementation of behaviour in the target language:
    a path to a directory containing the relevant code (Section 5.2).
    How the link is used is left to the backend."""

    path: str
    doc: Optional[str] = None


@dataclass(frozen=True)
class PortRef:
    """One endpoint of a connection: a port of an instance, or (when
    ``instance`` is None) of the enclosing Streamlet being implemented."""

    instance: Optional[str]
    port: str

    def __str__(self) -> str:
        return f"{self.instance}.{self.port}" if self.instance else self.port


@dataclass(frozen=True)
class Instance:
    """A named instance of a Streamlet declaration inside a structural
    implementation. ``domain_map`` assigns the instance's domains to the
    parent's domains (instance_domain -> parent_domain); unmapped
    domains default to the parent domain of the same name."""

    name: str
    streamlet: str
    domain_map: Tuple[Tuple[str, str], ...] = ()

    def __post_init__(self) -> None:
        _check_ident(self.name, "instance name")

    def parent_domain(self, instance_domain: str) -> str:
        for inst_d, parent_d in self.domain_map:
            if inst_d == instance_domain:
                return parent_d
        return instance_domain


@dataclass(frozen=True)
class Connection:
    """A connection between two ports. Explicitly not an assignment: the
    source and sink of each resulting physical stream is determined
    during lowering (Section 5.1)."""

    a: PortRef
    b: PortRef


@dataclass(frozen=True)
class StructuralImplementation:
    """Instances of Streamlets plus connections between their ports and
    the ports of the enclosing Streamlet (Section 5.1)."""

    instances: Tuple[Instance, ...] = ()
    connections: Tuple[Connection, ...] = ()
    doc: Optional[str] = None

    def __post_init__(self) -> None:
        names = [i.name for i in self.instances]
        if len(set(names)) != len(names):
            raise IRError(f"structural implementation has duplicate instance names: {names}")

    def instance(self, name: str) -> Instance:
        for i in self.instances:
            if i.name == name:
                return i
        raise KeyError(f"no instance {name!r}")


Implementation = LinkImplementation | StructuralImplementation


@dataclass(frozen=True)
class Streamlet:
    """A component: an Interface plus an optional Implementation.

    Streamlets are the intended output of a project (Section 5); they
    can be *subsetted* to their Interface, e.g. to express alternate
    implementations of the same component or to substitute one for
    testing (Section 6.2).
    """

    interface: Interface
    implementation: Optional[Implementation] = None
    doc: Optional[str] = None

    def subset(self) -> Interface:
        """Subset this Streamlet to its Interface."""
        return self.interface


@dataclass
class Namespace:
    """A container of declarations. Its only innate property is its
    name, expressible as a ``::``-separated path; paths are purely
    abstract and communicate hierarchy to a backend (Section 7.2)."""

    name: str
    types: dict = field(default_factory=dict)
    interfaces: dict = field(default_factory=dict)
    streamlets: dict = field(default_factory=dict)
    implementations: dict = field(default_factory=dict)

    def __post_init__(self) -> None:
        for part in self.name.split("::"):
            _check_ident(part, "namespace path segment")

    def declare_type(self, name: str, typ) -> None:
        self._declare(self.types, name, typ)

    def declare_interface(self, name: str, iface: Interface) -> None:
        self._declare(self.interfaces, name, iface)

    def declare_streamlet(self, name: str, s: Streamlet) -> None:
        self._declare(self.streamlets, name, s)

    def declare_implementation(self, name: str, impl: Implementation) -> None:
        self._declare(self.implementations, name, impl)

    def _declare(self, table: dict, name: str, value) -> None:
        _check_ident(name, "declaration name")
        if name in table:
            raise IRError(f"duplicate declaration {name!r} in namespace {self.name!r}")
        table[name] = value
