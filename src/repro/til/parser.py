"""Recursive-descent parser for TIL (paper Section 7.2).

Grammar (paper's productions, concretized)::

    project     := namespace*
    namespace   := "namespace" path "{" decl* "}"
    path        := ident ("::" ident)*
    decl        := doc? ( type_decl | interface_decl | streamlet_decl | impl_decl )
    type_decl   := "type" ident "=" type_expr ";"
    type_expr   := path                      -- reference to a declared type
                 | "Null"
                 | "Bits" "(" int ")"
                 | "Group" "(" field ("," field)* ","? ")"
                 | "Union" "(" field ("," field)* ","? ")"
                 | "Stream" "(" stream_prop ("," stream_prop)* ","? ")"
    field       := ident ":" type_expr
    stream_prop := "data" ":" type_expr | "throughput" ":" number
                 | "dimensionality" ":" int | "synchronicity" ":" ident
                 | "complexity" ":" int | "direction" ":" ident
                 | "user" ":" type_expr | "keep" ":" ("true"|"false")
    interface_decl := "interface" ident "=" iface_expr ";"
    iface_expr  := path                      -- reference; a streamlet
                                            -- reference subsets it (§5)
                 | domains? "(" port ("," port)* ","? ")"
    domains     := "<" "'"ident ("," "'"ident)* ">"
    port        := doc? ident ":" ("in"|"out") type_expr ("'"ident)?
    streamlet_decl := "streamlet" ident "=" iface_expr impl_suffix? ";"
    impl_suffix := "{" impl_body "}"
    impl_decl   := "impl" ident "=" iface_expr "{" impl_body "}" ";"
    impl_body   := string                    -- linked implementation
                 | path                      -- reference to a named impl
                 | stmt*                     -- structural implementation
    stmt        := doc? ( instance | connection )
    instance    := ident "=" path dom_assign? ";"
    dom_assign  := "<" dom_arg ("," dom_arg)* ">"
    dom_arg     := "'"ident                  -- positional parent domain
                 | "'"ident "=" "'"ident     -- instance dom = parent dom
    connection  := port_ref "--" port_ref ";"
    port_ref    := ident ("." ident)?

Identifier references resolve against the current namespace or a fully
qualified ``ns::path::name``; declaration must precede use (the
prototype's query system resolves on demand; the textual grammar keeps
ordering explicit). Documentation ``#...#`` must precede its subject
and becomes an IR property of the declaration or port (Listing 1).
"""
from __future__ import annotations

from fractions import Fraction
from typing import List, Optional, Tuple

from ..core.ir import (
    Connection,
    Instance,
    Interface,
    LinkImplementation,
    Port,
    PortMode,
    PortRef,
    Streamlet,
    StructuralImplementation,
    Namespace,
)
from ..core.project import Project
from ..core.types import (
    Bits,
    Direction,
    Field,
    Group,
    LogicalType,
    Null,
    Stream,
    Synchronicity,
    Union,
)
from .lexer import Token, tokenize


class ParseError(ValueError):
    """Raised on syntax or resolution errors in TIL source."""


_SYNCHRONICITY = {s.value: s for s in Synchronicity}
_DIRECTION = {d.value: d for d in Direction}


class _Parser:
    def __init__(self, source: str) -> None:
        self.tokens = tokenize(source)
        self.pos = 0
        self.project = Project()
        self.ns: Optional[Namespace] = None

    # -- token helpers ---------------------------------------------------

    def peek(self, ahead: int = 0) -> Token:
        return self.tokens[min(self.pos + ahead, len(self.tokens) - 1)]

    def next(self) -> Token:
        t = self.peek()
        self.pos += 1
        return t

    def expect(self, kind: str) -> Token:
        t = self.next()
        if t.kind != kind:
            raise ParseError(f"expected {kind!r}, got {t!r}")
        return t

    def accept(self, kind: str) -> Optional[Token]:
        if self.peek().kind == kind:
            return self.next()
        return None

    def ident(self) -> str:
        return self.expect("ident").text

    def maybe_doc(self) -> Optional[str]:
        t = self.accept("doc")
        return t.text if t else None

    def path(self) -> str:
        parts = [self.ident()]
        while self.accept("::"):
            parts.append(self.ident())
        return "::".join(parts)

    # -- top level -------------------------------------------------------

    def parse(self) -> Project:
        while self.peek().kind != "eof":
            self.namespace()
        return self.project

    def namespace(self) -> None:
        kw = self.expect("ident")
        if kw.text != "namespace":
            raise ParseError(f"expected 'namespace', got {kw!r}")
        name = self.path()
        self.ns = self.project.add_namespace(Namespace(name))
        self.expect("{")
        while not self.accept("}"):
            self.declaration()
        self.ns = None

    def declaration(self) -> None:
        doc = self.maybe_doc()
        kw = self.expect("ident").text
        if kw == "type":
            name = self.ident()
            self.expect("=")
            typ = self.type_expr()
            self.expect(";")
            self.ns.declare_type(name, typ)
        elif kw == "interface":
            name = self.ident()
            self.expect("=")
            iface = self.iface_expr(doc)
            self.expect(";")
            self.ns.declare_interface(name, iface)
        elif kw == "streamlet":
            name = self.ident()
            self.expect("=")
            iface = self.iface_expr(doc)
            impl = self.impl_suffix()
            self.expect(";")
            self.ns.declare_streamlet(name, Streamlet(iface, impl, doc=doc))
        elif kw == "impl":
            name = self.ident()
            self.expect("=")
            iface = self.iface_expr(None)
            self.expect("{")
            impl = self.impl_body(doc)
            self.expect("}")
            self.expect(";")
            self.ns.declare_implementation(name, impl)
        else:
            raise ParseError(f"unknown declaration keyword {kw!r}")

    # -- types -----------------------------------------------------------

    def type_expr(self) -> LogicalType:
        t = self.peek()
        if t.kind != "ident":
            raise ParseError(f"expected a type expression, got {t!r}")
        head = self.next().text
        if head == "Null":
            return Null()
        if head == "Bits":
            self.expect("(")
            width = int(self.expect("number").text)
            self.expect(")")
            return Bits(width)
        if head in ("Group", "Union"):
            fields = self.fields()
            return Group(fields) if head == "Group" else Union(fields)
        if head == "Stream":
            return self.stream_expr()
        # Reference (possibly qualified).
        self.pos -= 1
        return self.resolve_type(self.path())

    def fields(self) -> Tuple[Field, ...]:
        self.expect("(")
        out: List[Field] = []
        while not self.accept(")"):
            name = self.ident()
            self.expect(":")
            out.append(Field(name, self.type_expr()))
            if not self.accept(","):
                self.expect(")")
                break
        return tuple(out)

    def stream_expr(self) -> Stream:
        self.expect("(")
        props: dict = {}
        while not self.accept(")"):
            key = self.ident()
            self.expect(":")
            if key in ("data", "user"):
                props[key] = self.type_expr()
            elif key == "throughput":
                props[key] = Fraction(self.expect("number").text)
            elif key in ("dimensionality", "complexity"):
                props[key] = int(self.expect("number").text)
            elif key == "synchronicity":
                v = self.ident()
                if v not in _SYNCHRONICITY:
                    raise ParseError(f"unknown synchronicity {v!r}")
                props[key] = _SYNCHRONICITY[v]
            elif key == "direction":
                v = self.ident()
                if v not in _DIRECTION:
                    raise ParseError(f"unknown direction {v!r}")
                props[key] = _DIRECTION[v]
            elif key == "keep":
                v = self.ident()
                if v not in ("true", "false"):
                    raise ParseError(f"keep must be true or false, got {v!r}")
                props[key] = v == "true"
            else:
                raise ParseError(f"unknown Stream property {key!r}")
            if not self.accept(","):
                self.expect(")")
                break
        if "data" not in props:
            raise ParseError("Stream requires a data property")
        return Stream(**props)

    def resolve_type(self, ref: str) -> LogicalType:
        ns, name = self._split_ref(ref)
        try:
            return self.project.namespace(ns).types[name]
        except (KeyError, ValueError):
            raise ParseError(f"unknown type {ref!r} in namespace {self.ns.name!r}") from None

    def _split_ref(self, ref: str) -> Tuple[str, str]:
        if "::" in ref:
            ns, _, name = ref.rpartition("::")
            return ns, name
        return self.ns.name, ref

    # -- interfaces ------------------------------------------------------

    def iface_expr(self, doc: Optional[str]) -> Interface:
        if self.peek().kind == "ident":
            # Reference to a declared interface, or subsetting a
            # streamlet into an interface (paper's syntax sugar).
            ref = self.path()
            ns, name = self._split_ref(ref)
            namespace = self.project.namespace(ns)
            if name in namespace.interfaces:
                return namespace.interfaces[name]
            if name in namespace.streamlets:
                return namespace.streamlets[name].subset()
            raise ParseError(f"unknown interface or streamlet {ref!r}")
        domains: Tuple[str, ...] = ()
        if self.accept("<"):
            doms: List[str] = []
            while not self.accept(">"):
                doms.append(self.expect("domain").text)
                if not self.accept(","):
                    self.expect(">")
                    break
            domains = tuple(doms)
        self.expect("(")
        ports: List[Port] = []
        while not self.accept(")"):
            pdoc = self.maybe_doc()
            pname = self.ident()
            self.expect(":")
            mode = self.ident()
            if mode not in ("in", "out"):
                raise ParseError(f"port mode must be 'in' or 'out', got {mode!r}")
            typ = self.type_expr()
            dom = self.accept("domain")
            ports.append(
                Port(
                    pname,
                    PortMode(mode),
                    typ,
                    domain=dom.text if dom else (domains[0] if domains else "default"),
                    doc=pdoc,
                )
            )
            if not self.accept(","):
                self.expect(")")
                break
        return Interface(tuple(ports), domains=domains, doc=doc)

    # -- implementations -------------------------------------------------

    def impl_suffix(self):
        if not self.accept("{"):
            return None
        impl = self.impl_body(None)
        self.expect("}")
        return impl

    def impl_body(self, doc: Optional[str]):
        t = self.peek()
        if t.kind == "string":
            return LinkImplementation(self.next().text, doc=doc)
        # A bare reference to a named impl: `ident` followed directly by `}`.
        if t.kind == "ident" and self.peek(1).kind in ("}", "::"):
            ref = self.path()
            ns, name = self._split_ref(ref)
            try:
                return self.project.namespace(ns).implementations[name]
            except (KeyError, ValueError):
                raise ParseError(f"unknown implementation {ref!r}") from None
        instances: List[Instance] = []
        connections: List[Connection] = []
        while self.peek().kind not in ("}", "eof"):
            self.maybe_doc()  # statement docs are permitted and attached nowhere
            name = self.ident()
            if self.accept("="):
                # instance: name = streamlet_ref <domain assignments>;
                ref = self.path()
                dom_map: List[Tuple[str, str]] = []
                positional: List[str] = []
                if self.accept("<"):
                    while not self.accept(">"):
                        first = self.expect("domain").text
                        if self.accept("="):
                            second = self.expect("domain").text
                            dom_map.append((first, second))
                        else:
                            positional.append(first)
                        if not self.accept(","):
                            self.expect(">")
                            break
                self.expect(";")
                target = self.project.resolve_streamlet(ref, self.ns.name)
                inner = target.interface.domain_names
                for i, parent_dom in enumerate(positional):
                    if i >= len(inner):
                        raise ParseError(
                            f"instance {name!r}: too many positional domain assignments"
                        )
                    dom_map.append((inner[i], parent_dom))
                instances.append(Instance(name, ref, tuple(dom_map)))
            else:
                # connection: port_ref -- port_ref;
                a = self.port_ref_tail(name)
                self.expect("--")
                b = self.port_ref()
                self.expect(";")
                connections.append(Connection(a, b))
        return StructuralImplementation(tuple(instances), tuple(connections), doc=doc)

    def port_ref(self) -> PortRef:
        return self.port_ref_tail(self.ident())

    def port_ref_tail(self, first: str) -> PortRef:
        if self.accept("."):
            return PortRef(first, self.ident())
        return PortRef(None, first)


def parse_project(source: str, *, validate: bool = True) -> Project:
    """Parse TIL ``source`` into a :class:`~repro.core.project.Project`.

    With ``validate=True`` (default) every structural implementation is
    checked against the connection rules of Sections 4.2.2 / 5.1.
    """
    project = _Parser(source).parse()
    if validate:
        project.validate()
    return project
