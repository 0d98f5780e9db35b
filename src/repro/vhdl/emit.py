"""VHDL emission (paper Section 7.3, Listings 2 and 4).

The backend's passes are intentionally simple and leverage the query
system's incremental computation:

1. the "all streamlets" query retrieves every Streamlet declaration;
2. for each Streamlet, its Interface's Streams are split into physical
   streams, whose signals become component ports. Components get a
   unique name from the declaration and its namespace
   (``my__example__space__comp1_com``) and all go into a single VHDL
   package (namespaces are deliberately *not* mapped to packages);
3. for each Streamlet an architecture is imported or generated:
   (a) no implementation — an empty architecture;
   (b) a linked implementation — imported from an appropriately named
   ``.vhd`` file at the linked location (provided to the database as a
   ``("linked_file", path)`` input so the query system stays pure); an
   empty architecture template is generated when no such file exists;
   (c) a structural implementation — a generated architecture with port
   mappings for instances and signals connecting ports.

*Documentation* from the IR is converted into ``--`` comments on the
emitted component, ports and architectures (Listing 2).
"""
from __future__ import annotations

from typing import List, Tuple

from ..core.ir import (
    PortMode,
    PortRef,
    Streamlet,
    StructuralImplementation,
    LinkImplementation,
)
from ..core.physical import PhysicalStream
from ..query.db import QueryDB
from ..query.queries import TydiDB


def component_name(ns: str, name: str) -> str:
    """Unique component name from namespace path and declaration name."""
    return ns.replace("::", "__") + "__" + name + "_com"


def _vhdl_type(width: int) -> str:
    if width == 1:
        return "std_logic"
    return f"std_logic_vector({width - 1} downto 0)"


def _doc_comment(doc: str | None, indent: str) -> List[str]:
    if not doc:
        return []
    return [f"{indent}-- {line}" for line in doc.splitlines()]


def signal_ports(
    port_mode: PortMode, phys: Tuple[PhysicalStream, ...], spec_mode: str = "paper"
) -> List[Tuple[str, str, int]]:
    """Flatten physical streams into VHDL port entries
    ``(signal_name, "in"/"out", width)``.

    Direction: a sink-side (``in``) port receives forward signals and
    drives ``ready``; an ``out`` port is mirrored; a ``Reverse``
    physical stream flips the whole set again (request/response).
    """
    out: List[Tuple[str, str, int]] = []
    for ps in phys:
        flip = (port_mode is PortMode.OUT) ^ (ps.direction.value == "Reverse")
        for sig in ps.signals(spec_mode).values():
            inward = not sig.reversed_
            is_in = inward ^ flip
            out.append((f"{ps.name}_{sig.name}", "in" if is_in else "out", sig.width))
    return out


def register_vhdl_queries(db: TydiDB) -> TydiDB:
    """Register the backend's emission queries on a query database."""
    db.register(_vhdl_component, "vhdl_component")
    db.register(_vhdl_entity, "vhdl_entity")
    db.register(_vhdl_architecture, "vhdl_architecture")
    db.register(_vhdl_package, "vhdl_package")
    db.register(_vhdl_project, "vhdl_project")
    return db


def emit_project(db: TydiDB) -> str:
    """Emit the whole project: one package with every component, then an
    entity + architecture per Streamlet."""
    if "vhdl_project" not in db._queries:
        register_vhdl_queries(db)
    return db.query("vhdl_project")


# -- queries -------------------------------------------------------------


def _interface_port_lines(db: TydiDB, ns: str, name: str) -> List[str]:
    """The port list of a component/entity, documentation included."""
    s: Streamlet = db.query("streamlet", ns, name)
    split = db.query("split_streams", ns, name)
    entries: List[Tuple[str | None, List[Tuple[str, str, int]]]] = []
    for (pname, mode, phys), port in zip(split, s.interface.ports):
        entries.append((port.doc, signal_ports(PortMode(mode), phys)))

    lines: List[str] = []
    for dom in s.interface.domain_names:
        prefix = "" if dom == "default" else f"{dom}_"
        lines.append(f"    {prefix}clk : in std_logic;")
        lines.append(f"    {prefix}rst : in std_logic;")
    for doc, sigs in entries:
        for d in _doc_comment(doc, "    "):
            lines.append(d)
        for sig_name, direction, width in sigs:
            lines.append(f"    {sig_name} : {direction} {_vhdl_type(width)};")
    if lines:
        lines[-1] = lines[-1].rstrip(";")
    return lines


def _vhdl_component(db: TydiDB, ns: str, name: str) -> str:
    s: Streamlet = db.query("streamlet", ns, name)
    lines = _doc_comment(s.doc, "")
    lines.append(f"component {component_name(ns, name)}")
    lines.append("  port (")
    lines.extend(_interface_port_lines(db, ns, name))
    lines.append("  );")
    lines.append("end component;")
    return "\n".join(lines)


def _vhdl_entity(db: TydiDB, ns: str, name: str) -> str:
    s: Streamlet = db.query("streamlet", ns, name)
    cname = component_name(ns, name)
    lines = _doc_comment(s.doc, "")
    lines.append(f"entity {cname} is")
    lines.append("  port (")
    lines.extend(_interface_port_lines(db, ns, name))
    lines.append("  );")
    lines.append(f"end {cname};")
    return "\n".join(lines)


def _vhdl_architecture(db: TydiDB, ns: str, name: str) -> str:
    s: Streamlet = db.query("streamlet", ns, name)
    cname = component_name(ns, name)
    impl = s.implementation
    if impl is None:
        return f"architecture Behavioral of {cname} is\nbegin\nend Behavioral;"
    if isinstance(impl, LinkImplementation):
        # Imported from an appropriately named .vhd file at the linked
        # location; generate an empty architecture template otherwise.
        content = db.get_input("linked_file", f"{impl.path}/{name}.vhd", default=None)
        if content is not None:
            return content
        lines = _doc_comment(impl.doc, "")
        lines.append(f"-- linked implementation: {impl.path} (template generated)")
        lines.append(f"architecture Behavioral of {cname} is")
        lines.append("begin")
        lines.append("end Behavioral;")
        return "\n".join(lines)
    assert isinstance(impl, StructuralImplementation)
    return _structural_architecture(db, ns, name, s, impl)


def _structural_architecture(
    db: TydiDB, ns: str, name: str, s: Streamlet, impl: StructuralImplementation
) -> str:
    cname = component_name(ns, name)
    lines = _doc_comment(impl.doc, "")
    lines.append(f"architecture Structural of {cname} is")

    # Resolve each instance's split streams once.
    inst_split = {}
    inst_target = {}
    for inst in impl.instances:
        ref = inst.streamlet
        if "::" in ref:
            ins, _, iname = ref.rpartition("::")
        else:
            ins, iname = ns, ref
        inst_target[inst.name] = (ins, iname)
        inst_split[inst.name] = dict(
            (pname, (PortMode(mode), phys))
            for pname, mode, phys in db.query("split_streams", ins, iname)
        )
    outer_split = dict(
        (pname, (PortMode(mode), phys))
        for pname, mode, phys in db.query("split_streams", ns, name)
    )

    def ref_signals(ref: PortRef) -> List[Tuple[str, str, int]]:
        if ref.instance is None:
            mode, phys = outer_split[ref.port]
        else:
            mode, phys = inst_split[ref.instance][ref.port]
        return signal_ports(mode, phys)

    # One VHDL signal per physical signal of each instance-to-instance
    # connection; enclosing-port connections map directly.
    sig_decls: List[str] = []
    port_assign: dict = {}  # (instance, signal_name) -> actual
    for i, conn in enumerate(impl.connections):
        endpoints = [conn.a, conn.b]
        inner = [e for e in endpoints if e.instance is not None]
        outer = [e for e in endpoints if e.instance is None]
        if outer:
            # Map instance signals straight onto the enclosing port's.
            if inner:
                for (s_in, _, _), (s_out, _, _) in zip(
                    ref_signals(inner[0]), ref_signals(outer[0])
                ):
                    port_assign[(inner[0].instance, s_in)] = s_out
            # outer -- outer pass-through would need signal assignments;
            # emitted as direct signal copies.
            else:
                for (sa, da, wa), (sb, _, _) in zip(
                    ref_signals(conn.a), ref_signals(conn.b)
                ):
                    lines.append(f"  -- pass-through {sa} <-> {sb}")
        else:
            for (sa, da, wa), (sb, _, _) in zip(ref_signals(conn.a), ref_signals(conn.b)):
                wire = f"conn_{i}_{conn.a.instance}_{sa}"
                sig_decls.append(f"  signal {wire} : {_vhdl_type(wa)};")
                port_assign[(conn.a.instance, sa)] = wire
                port_assign[(conn.b.instance, sb)] = wire
    lines.extend(sig_decls)
    lines.append("begin")
    for inst in impl.instances:
        ins, iname = inst_target[inst.name]
        lines.append(f"  {inst.name}: {component_name(ins, iname)}")
        lines.append("    port map (")
        pm: List[str] = []
        target = db.query("streamlet", ins, iname)
        for dom in target.interface.domain_names:
            parent = inst.parent_domain(dom)
            iprefix = "" if dom == "default" else f"{dom}_"
            pprefix = "" if parent == "default" else f"{parent}_"
            pm.append(f"      {iprefix}clk => {pprefix}clk")
            pm.append(f"      {iprefix}rst => {pprefix}rst")
        for pname, (mode, phys) in inst_split[inst.name].items():
            for sig_name, _, _ in signal_ports(mode, phys):
                actual = port_assign.get((inst.name, sig_name), sig_name)
                pm.append(f"      {sig_name} => {actual}")
        lines.append(",\n".join(pm))
        lines.append("    );")
    lines.append("end Structural;")
    return "\n".join(lines)


def _vhdl_package(db: TydiDB) -> str:
    """All namespaces are combined into a single package (Section 7.3)."""
    lines = [
        "library ieee;",
        "use ieee.std_logic_1164.all;",
        "",
        "package proj_pkg is",
    ]
    for ns, name in db.query("all_streamlets"):
        comp = db.query("vhdl_component", ns, name)
        lines.extend("  " + line if line else "" for line in comp.splitlines())
        lines.append("")
    lines.append("end proj_pkg;")
    return "\n".join(lines)


def _vhdl_project(db: TydiDB) -> str:
    parts = [db.query("vhdl_package")]
    for ns, name in db.query("all_streamlets"):
        parts.append(db.query("vhdl_entity", ns, name))
        parts.append(db.query("vhdl_architecture", ns, name))
    return "\n\n".join(parts) + "\n"
