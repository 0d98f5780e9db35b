"""Parser for the proposed testing grammar (paper Section 6.1).

Three statement forms, mirroring the paper's examples::

    adder.out = ("10", "01", "11");           // parallel port assertion
    adder.add = {                             // combined Stream with a
        in1: ("01", "01", "10"),              // Reverse child: one
        out: ("10", "01", "11"),              // assertion per field
    };
    sequence "sequence name" {                // explicit stages for
        "initial state": {                    // stateful components;
            counter.count = "0000";           // within a stage,
        }, "increment": {                     // assertions are parallel
            counter.increment = "1";
        },
    };

Round parentheses enclose a series of elements transferred over a
Stream without dimensionality; square brackets indicate dimensionality
(``[["1", "0"], ["0"]]``). A bare string is a single-element series.
Assertions use equality, not assign/compare: whether a value is driven
or observed is determined from the port's (or child Stream's)
direction by the runner.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any, Dict, List, Tuple, Union as TyUnion

from ..til.lexer import Token, tokenize


class TBParseError(ValueError):
    """Raised on malformed testbench source."""


@dataclass(frozen=True)
class PortAssertion:
    """``instance.port = data;`` — the transaction on the port equals
    ``data`` (driven or observed depending on stream direction)."""

    instance: str
    port: str
    data: Any  # tuple of elements, or nested lists for dimensionality


@dataclass(frozen=True)
class FieldAssertion:
    """``instance.port = { field: data, ... };`` — per-field assertions
    on a port whose Stream combines Forward and Reverse children."""

    instance: str
    port: str
    fields: Tuple[Tuple[str, Any], ...]


@dataclass(frozen=True)
class SequenceBlock:
    """``sequence "name" { "stage": { ... }, ... };`` — stages run in
    order; assertions within a stage run in parallel; each stage must
    pass before the next starts."""

    name: str
    stages: Tuple[Tuple[str, Tuple[PortAssertion, ...]], ...]


Statement = TyUnion[PortAssertion, FieldAssertion, SequenceBlock]


class _P:
    def __init__(self, src: str) -> None:
        self.toks: List[Token] = tokenize(src)
        self.i = 0

    def peek(self) -> Token:
        return self.toks[min(self.i, len(self.toks) - 1)]

    def next(self) -> Token:
        t = self.peek()
        self.i += 1
        return t

    def expect(self, kind: str) -> Token:
        t = self.next()
        if t.kind != kind:
            raise TBParseError(f"expected {kind!r}, got {t!r}")
        return t

    def accept(self, kind: str):
        if self.peek().kind == kind:
            return self.next()
        return None

    # -- data literals ---------------------------------------------------

    def data(self) -> Any:
        t = self.peek()
        if t.kind == "string":
            return (self.next().text,)
        if t.kind == "(":
            self.next()
            items: List[Any] = []
            while not self.accept(")"):
                items.append(self.expect("string").text)
                if not self.accept(","):
                    self.expect(")")
                    break
            return tuple(items)
        if t.kind == "[":
            return self.bracket_list()
        raise TBParseError(f"expected a data literal, got {t!r}")

    def bracket_list(self) -> list:
        self.expect("[")
        items: List[Any] = []
        while not self.accept("]"):
            t = self.peek()
            if t.kind == "[":
                items.append(self.bracket_list())
            else:
                items.append(self.expect("string").text)
            if not self.accept(","):
                self.expect("]")
                break
        return items

    # -- statements ------------------------------------------------------

    def assertion(self) -> TyUnion[PortAssertion, FieldAssertion]:
        inst = self.expect("ident").text
        self.expect(".")
        port = self.expect("ident").text
        self.expect("=")
        if self.accept("{"):
            fields: List[Tuple[str, Any]] = []
            while not self.accept("}"):
                fname = self.expect("ident").text
                self.expect(":")
                fields.append((fname, self.data()))
                if not self.accept(","):
                    self.expect("}")
                    break
            self.expect(";")
            return FieldAssertion(inst, port, tuple(fields))
        d = self.data()
        self.expect(";")
        return PortAssertion(inst, port, d)

    def statement(self) -> Statement:
        t = self.peek()
        if t.kind == "ident" and t.text == "sequence":
            self.next()
            name = self.expect("string").text
            self.expect("{")
            stages: List[Tuple[str, Tuple[PortAssertion, ...]]] = []
            while not self.accept("}"):
                sname = self.expect("string").text
                self.expect(":")
                self.expect("{")
                asserts: List[PortAssertion] = []
                while not self.accept("}"):
                    a = self.assertion()
                    if not isinstance(a, PortAssertion):
                        raise TBParseError("field assertions are not allowed in stages")
                    asserts.append(a)
                stages.append((sname, tuple(asserts)))
                if not self.accept(","):
                    self.expect("}")
                    break
            self.expect(";")
            return SequenceBlock(name, tuple(stages))
        return self.assertion()

    def parse(self) -> List[Statement]:
        out: List[Statement] = []
        while self.peek().kind != "eof":
            out.append(self.statement())
        return out


def parse_testbench(source: str) -> List[Statement]:
    """Parse testbench ``source`` into statements."""
    return _P(source).parse()
