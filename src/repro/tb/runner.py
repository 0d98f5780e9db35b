"""Testbench runner: executes transaction-level assertions against a
behavioural model (paper Sections 6.1–6.2).

The runner realizes the two key properties of the proposed grammar:

1. assertions are parallel by default — a stage's driven transactions
   are presented to the model together, and all observed transactions
   are compared afterwards; ``sequence`` blocks impose ordering only
   *between* stages;
2. whether a port's value is driven or observed is determined
   automatically from the resolved physical stream's direction
   (port mode composed with Reverse children), implementing equality
   semantics rather than assign/compare.

Every transaction actually crosses the transfer layer: driven data is
serialized into a transfer trace at the port's lanes/dimensionality/
complexity, validated against the complexity contract, and
deserialized for the model; observed data takes the same path in
reverse. A model therefore cannot pass a testbench through a channel
the physical stream could not legally carry.

*Substitution* (Section 6.2): models are provided per instance name, so
any dependency can be stubbed by supplying a different model — see
:class:`StubModel`.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Dict, List, Optional, Protocol, Tuple

from ..core.ir import PortMode
from ..core.lower import split_stream
from ..core.physical import PhysicalStream
from ..core.project import Project
from ..core.types import Direction
from ..sim import deserialize, serialize, validate_trace
from .grammar import FieldAssertion, PortAssertion, SequenceBlock, Statement


class Model(Protocol):
    """Behavioural model of a Streamlet: one call per stage, taking the
    stage's driven transactions (keyed ``port`` or ``port.field``) and
    returning the transactions it produces."""

    def transact(self, inputs: Dict[str, Any]) -> Dict[str, Any]:
        ...


class StubModel:
    """A substitution stub (Section 6.2): replays canned outputs and
    records what it was driven with."""

    def __init__(self, outputs: Optional[Dict[str, Any]] = None) -> None:
        self.outputs = outputs or {}
        self.driven: List[Dict[str, Any]] = []

    def transact(self, inputs: Dict[str, Any]) -> Dict[str, Any]:
        self.driven.append(inputs)
        return dict(self.outputs)


@dataclass
class TestbenchResult:
    passed: bool
    failures: List[str] = field(default_factory=list)
    stages_run: int = 0


def _norm(x: Any) -> Any:
    if isinstance(x, (tuple, list)):
        return [_norm(v) for v in x]
    return x


def run_testbench(
    statements: List[Statement],
    project: Project,
    instances: Dict[str, Tuple[str, str]],
    models: Dict[str, Model],
) -> TestbenchResult:
    """Execute testbench ``statements``.

    ``instances`` maps testbench instance names to ``(namespace,
    streamlet)`` declarations; ``models`` maps them to behavioural
    models (substitute freely). Top-level assertions form one implicit
    parallel stage; each :class:`SequenceBlock` contributes its stages
    in order, stopping at the first failing stage.
    """
    result = TestbenchResult(passed=True)

    top_level = [s for s in statements if not isinstance(s, SequenceBlock)]
    stages: List[Tuple[str, List[Statement]]] = []
    if top_level:
        stages.append(("<parallel>", top_level))
    for s in statements:
        if isinstance(s, SequenceBlock):
            stages.extend((f"{s.name}/{n}", list(a)) for n, a in s.stages)

    for stage_name, asserts in stages:
        ok = _run_stage(stage_name, asserts, project, instances, models, result)
        result.stages_run += 1
        if not ok:
            result.passed = False
            break
    return result


def _run_stage(
    stage_name: str,
    asserts: List[Statement],
    project: Project,
    instances: Dict[str, Tuple[str, str]],
    models: Dict[str, Model],
    result: TestbenchResult,
) -> bool:
    # key: (instance, label) -> (phys, expected-data); label is the
    # port name or "port.field".
    driven: Dict[str, Dict[str, Any]] = {}
    observed: List[Tuple[str, str, PhysicalStream, Any]] = []

    for a in asserts:
        inst = a.instance
        if inst not in instances:
            result.failures.append(f"{stage_name}: unknown instance {inst!r}")
            return False
        ns, sname = instances[inst]
        streamlet = project.namespace(ns).streamlets[sname]
        try:
            port = streamlet.interface.port(a.port)
        except KeyError:
            result.failures.append(
                f"{stage_name}: {inst}.{a.port}: no such port on {ns}::{sname}"
            )
            return False
        phys_by_name = {p.name: p for p in split_stream(port.name, port.typ)}

        pairs: List[Tuple[str, str, Any]]
        if isinstance(a, FieldAssertion):
            pairs = [
                (f"{a.port}.{fname}", f"{a.port}__{fname}", data)
                for fname, data in a.fields
            ]
        else:
            pairs = [(a.port, a.port, a.data)]

        for label, phys_name, data in pairs:
            ps = phys_by_name.get(phys_name)
            if ps is None:
                result.failures.append(
                    f"{stage_name}: {inst}.{label}: no physical stream {phys_name!r} "
                    f"(available: {sorted(phys_by_name)})"
                )
                return False
            bench_drives = (port.mode is PortMode.IN) == (
                ps.direction is Direction.FORWARD
            )
            if bench_drives:
                value = _through_transfer_layer(data, ps)
                driven.setdefault(inst, {})[label] = value
            else:
                observed.append((inst, label, ps, data))

    # Present all driven transactions of the stage in parallel.
    outputs: Dict[str, Dict[str, Any]] = {}
    touched = set(driven) | {i for i, _, _, _ in observed}
    for inst in touched:
        model = models.get(inst)
        if model is None:
            result.failures.append(f"{stage_name}: no model for instance {inst!r}")
            return False
        outputs[inst] = model.transact(driven.get(inst, {}))

    ok = True
    for inst, label, ps, expected in observed:
        if label not in outputs.get(inst, {}):
            result.failures.append(
                f"{stage_name}: {inst}.{label}: model produced no transaction"
            )
            ok = False
            continue
        got = _through_transfer_layer(outputs[inst][label], ps)
        if _norm(got) != _norm(expected):
            result.failures.append(
                f"{stage_name}: {inst}.{label}: expected {_norm(expected)!r}, got {_norm(got)!r}"
            )
            ok = False
    return ok


def _through_transfer_layer(data: Any, ps: PhysicalStream) -> Any:
    """Round a transaction through the physical transfer layer: abstract
    data -> legal trace at the stream's complexity -> validated ->
    abstract data. This is where the IR + backend 'generate the
    necessary signaling behaviour' (Section 6.1)."""
    lifetime = _norm(data)
    trace = serialize(
        lifetime,
        lanes=ps.lanes,
        dimensionality=ps.dimensionality,
        complexity=ps.complexity,
    )
    validate_trace(
        trace,
        lanes=ps.lanes,
        dimensionality=ps.dimensionality,
        complexity=ps.complexity,
    )
    return deserialize(trace, dimensionality=ps.dimensionality)
