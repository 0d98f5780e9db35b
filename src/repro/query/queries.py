"""IR queries on top of :class:`repro.query.db.QueryDB`.

The database stores type, Interface, Streamlet, Implementation and
Namespace declarations as *inputs*; derived information — the primary
"all streamlets" output, splitting a Stream into physical streams, and
(registered separately by the VHDL backend) emitted text — is computed
on demand and memoized (paper Section 7.1).
"""
from __future__ import annotations

from typing import Tuple

from ..core.ir import PortMode, Streamlet
from ..core.lower import split_stream
from ..core.physical import PhysicalStream
from ..core.project import Project
from .db import QueryDB


class TydiDB(QueryDB):
    """Query database pre-registered with the core IR queries."""

    def __init__(self) -> None:
        super().__init__()
        self.register(_all_streamlets, "all_streamlets")
        self.register(_streamlet, "streamlet")
        self.register(_split_streams, "split_streams")

    # -- population ------------------------------------------------------

    def load_project(self, project: Project) -> None:
        """Load (or re-load) a Project's declarations as inputs. Values
        that did not change do not advance their changed-at revision,
        so downstream memos stay valid."""
        self.set_input("namespaces", tuple(project.namespaces))
        for ns in project.namespaces.values():
            self.set_input("streamlet_names", ns.name, tuple(ns.streamlets))
            for name, s in ns.streamlets.items():
                self.set_input("streamlet", ns.name, name, s)
            self.set_input("type_names", ns.name, tuple(ns.types))
            for name, t in ns.types.items():
                self.set_input("type", ns.name, name, t)

    def set_streamlet(self, ns: str, name: str, s: Streamlet) -> None:
        """Point update of one Streamlet declaration (for incremental
        recomputation tests/benchmarks)."""
        names = self.get_input("streamlet_names", ns, default=())
        if name not in names:
            self.set_input("streamlet_names", ns, names + (name,))
        self.set_input("streamlet", ns, name, s)

    # -- typed accessors -------------------------------------------------

    def all_streamlets(self) -> Tuple[Tuple[str, str], ...]:
        return self.query("all_streamlets")

    def streamlet(self, ns: str, name: str) -> Streamlet:
        return self.query("streamlet", ns, name)

    def split_streams(
        self, ns: str, name: str
    ) -> Tuple[Tuple[str, str, Tuple[PhysicalStream, ...]], ...]:
        """Physical streams per port of a Streamlet:
        ``((port_name, mode, (physical, ...)), ...)``."""
        return self.query("split_streams", ns, name)


def _all_streamlets(db: QueryDB) -> Tuple[Tuple[str, str], ...]:
    """The primary output of the system: all Streamlet declarations of
    the project, as (namespace, name) pairs."""
    out = []
    for ns in db.get_input("namespaces"):
        for name in db.get_input("streamlet_names", ns, default=()):
            out.append((ns, name))
    return tuple(out)


def _streamlet(db: QueryDB, ns: str, name: str) -> Streamlet:
    return db.get_input("streamlet", ns, name)


def _split_streams(db: QueryDB, ns: str, name: str):
    s: Streamlet = db.query("streamlet", ns, name)
    out = []
    for port in s.interface.ports:
        phys = tuple(split_stream(port.name, port.typ))
        out.append((port.name, port.mode.value, phys))
    return tuple(out)
