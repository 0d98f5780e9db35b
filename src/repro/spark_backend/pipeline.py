"""Structural composition on Spark: execute a Streamlet as a dataflow
of DataFrame transformations.

This is the backend's analogue of the VHDL backend's structural
architecture generation (Section 7.3, pass 3c): instances become
operator applications, connections become dataflow edges, and the
enclosing Streamlet's in/out ports become the pipeline's inputs and
outputs. Interface contracts — the Tydi types on every port — are
checked as Spark schemas at every boundary, so an ill-typed composition
fails at build time exactly where the IR's connection rules say it
should, not at action time deep inside Catalyst.

Reverse child Streams (request/response) have no DataFrame analogue —
Spark dataflow is acyclic — so the Spark backend requires forward-only
port types; this is checked up front.
"""
from __future__ import annotations

from typing import Dict, Optional

from pyspark.sql import DataFrame

from ..core.ir import (
    LinkImplementation,
    PortMode,
    PortRef,
    Streamlet,
    StructuralImplementation,
)
from ..core.project import Project
from ..core.types import Direction, Stream
from .schema import check_port_schema
from .streamlets import BehaviorNotFound, BehaviorRegistry

_LINK_PREFIX = "spark://"


class SparkBackend:
    """Runs Streamlets of a Project as Spark dataflow pipelines."""

    def __init__(self, project: Project, registry: BehaviorRegistry) -> None:
        self.project = project
        self.registry = registry
        project.validate()

    # -- behaviour resolution -------------------------------------------

    def _behavior_key(self, ns: str, name: str, s: Streamlet) -> str:
        impl = s.implementation
        if isinstance(impl, LinkImplementation) and impl.path.startswith(_LINK_PREFIX):
            return impl.path[len(_LINK_PREFIX):]
        return f"{ns}::{name}"

    # -- execution -------------------------------------------------------

    def run(
        self,
        ns: str,
        name: str,
        inputs: Dict[str, DataFrame],
        *,
        check: bool = True,
    ) -> Dict[str, DataFrame]:
        """Execute Streamlet ``ns::name`` on the given input DataFrames
        (one per ``in`` port) and return one DataFrame per ``out``
        port. Lazy throughout: nothing is collected, the result holds
        composed transformations."""
        s = self.project.namespace(ns).streamlets[name]
        iface = s.interface
        in_ports = [p for p in iface.ports if p.mode is PortMode.IN]
        out_ports = [p for p in iface.ports if p.mode is PortMode.OUT]
        if set(inputs) != {p.name for p in in_ports}:
            raise ValueError(
                f"{ns}::{name}: inputs {sorted(inputs)} != in-ports "
                f"{sorted(p.name for p in in_ports)}"
            )
        for p in iface.ports:
            _require_forward(ns, name, p.name, p.typ)
        if check:
            for p in in_ports:
                check_port_schema(p.name, p.typ, inputs[p.name].schema)

        if isinstance(s.implementation, StructuralImplementation):
            outputs = self._run_structural(ns, name, s, inputs, check=check)
        else:
            behavior = self._resolve_behavior(ns, name, s)
            outputs = behavior(dict(inputs))
        if set(outputs) != {p.name for p in out_ports}:
            raise ValueError(
                f"{ns}::{name}: behaviour produced {sorted(outputs)}, "
                f"declared out-ports {sorted(p.name for p in out_ports)}"
            )
        if check:
            for p in out_ports:
                check_port_schema(p.name, p.typ, outputs[p.name].schema)
        return outputs

    def _resolve_behavior(self, ns: str, name: str, s: Streamlet):
        try:
            return self.registry.get(self._behavior_key(ns, name, s))
        except BehaviorNotFound:
            raise BehaviorNotFound(
                f"streamlet {ns}::{name} has no structural implementation and "
                f"no registered Spark behaviour"
            ) from None

    def _run_structural(
        self,
        ns: str,
        name: str,
        s: Streamlet,
        inputs: Dict[str, DataFrame],
        *,
        check: bool,
    ) -> Dict[str, DataFrame]:
        impl = s.implementation
        assert isinstance(impl, StructuralImplementation)

        # Classify each connection endpoint: inside the architecture,
        # enclosing in-ports and instance out-ports *drive*; enclosing
        # out-ports and instance in-ports *consume* (same rule as
        # Project.validate_structural).
        resolved = {
            inst.name: self.project.resolve_streamlet(inst.streamlet, ns)
            for inst in impl.instances
        }

        def is_driver(ref: PortRef) -> bool:
            if ref.instance is None:
                return s.interface.port(ref.port).mode is PortMode.IN
            return resolved[ref.instance].interface.port(ref.port).mode is PortMode.OUT

        # consumer endpoint -> driver endpoint
        feeds: Dict[PortRef, PortRef] = {}
        for conn in impl.connections:
            driver, consumer = (
                (conn.a, conn.b) if is_driver(conn.a) else (conn.b, conn.a)
            )
            feeds[consumer] = driver

        # Dataflow values per driver endpoint.
        values: Dict[PortRef, DataFrame] = {
            PortRef(None, p): df for p, df in inputs.items()
        }
        pending = {inst.name for inst in impl.instances}
        while pending:
            progressed = False
            for inst_name in sorted(pending):
                target = resolved[inst_name]
                needed = [
                    p.name for p in target.interface.ports if p.mode is PortMode.IN
                ]
                drivers = [feeds[PortRef(inst_name, p)] for p in needed]
                if not all(d in values for d in drivers):
                    continue
                inst = impl.instance(inst_name)
                tns, tname = self._target_of(ns, inst.streamlet)
                inst_inputs = {
                    p: values[d] for p, d in zip(needed, drivers)
                }
                outs = self.run(tns, tname, inst_inputs, check=check)
                for pname, df in outs.items():
                    values[PortRef(inst_name, pname)] = df
                pending.discard(inst_name)
                progressed = True
            if not progressed:
                raise ValueError(
                    f"{ns}::{name}: dataflow cycle through instances {sorted(pending)}"
                )
        out: Dict[str, DataFrame] = {}
        for p in s.interface.ports:
            if p.mode is PortMode.OUT:
                out[p.name] = values[feeds[PortRef(None, p.name)]]
        return out

    def _target_of(self, ns: str, ref: str):
        if "::" in ref:
            tns, _, tname = ref.rpartition("::")
            return tns, tname
        return ns, ref


def _require_forward(ns: str, name: str, port: str, stream: Stream) -> None:
    for t in stream.walk():
        if isinstance(t, Stream) and t.direction is Direction.REVERSE:
            raise ValueError(
                f"{ns}::{name} port {port!r}: Reverse child Streams have no "
                "Spark-dataflow analogue (acyclic DataFrames); use the "
                "transfer simulator for request/response behaviour"
            )
