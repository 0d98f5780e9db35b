"""Transaction-level verification (paper Section 6): grammar, parallel
assertions, sequences, automatic sink/source determination, and
substitution."""
import pytest

from repro.tb import (
    FieldAssertion,
    PortAssertion,
    SequenceBlock,
    parse_testbench,
    run_testbench,
)
from repro.tb.grammar import TBParseError
from repro.tb.runner import StubModel
from repro.til import parse_project

PROJECT = parse_project(
    """
    namespace test {
    type bits2 = Stream(data: Bits(2), complexity: 2);
    streamlet adder = (in1: in bits2, in2: in bits2, out: out bits2);
    type addgroup = Stream(data: Group(
        in1: Stream(data: Bits(2), complexity: 2),
        in2: Stream(data: Bits(2), complexity: 2),
        out: Stream(data: Bits(2), complexity: 2, direction: Reverse),
    ), complexity: 2);
    streamlet adder2 = (add: in addgroup);
    streamlet counter = (
        count: out Stream(data: Bits(4), complexity: 2),
        increment: in Stream(data: Bits(1), complexity: 2),
    );
    streamlet seq_sink = (chars: in Stream(data: Bits(8), dimensionality: 1, complexity: 4));
    }
    """
)

ADDER_TB = """
adder.out = ("10", "01", "11");
adder.in1 = ("01", "01", "10");
adder.in2 = ("01", "00", "01");
"""

COUNTER_TB = """
sequence "sequence name" {
    "initial state": {
        counter.count = "0000";
    }, "increment": {
        counter.increment = "1";
    }, "result state": {
        counter.count = "0001";
    },
};
"""


class AdderModel:
    """Reference adder: stateless, adds per-element (mod 4)."""

    def transact(self, ins):
        a = ins.get("in1") or ins.get("add.in1")
        b = ins.get("in2") or ins.get("add.in2")
        out = [format((int(x, 2) + int(y, 2)) % 4, "02b") for x, y in zip(a, b)]
        return {"out" if "in1" in ins else "add.out": out}


class CounterModel:
    def __init__(self):
        self.value = 0

    def transact(self, ins):
        self.value += len(ins.get("increment", []))
        return {"count": [format(self.value, "04b")]}


class TestGrammar:
    def test_port_assertion(self):
        [a] = parse_testbench('adder.out = ("10", "01", "11");')
        assert a == PortAssertion("adder", "out", ("10", "01", "11"))

    def test_single_string_is_one_element(self):
        [a] = parse_testbench('counter.count = "0000";')
        assert a.data == ("0000",)

    def test_dimensionality_brackets(self):
        [a] = parse_testbench('sink.chars = [["1", "0"], ["0"]];')
        assert a.data == [["1", "0"], ["0"]]

    def test_field_assertion(self):
        [a] = parse_testbench(
            'adder.add = { in1: ("01"), in2: ("01"), out: ("10") };'
        )
        assert isinstance(a, FieldAssertion)
        assert a.fields == (("in1", ("01",)), ("in2", ("01",)), ("out", ("10",)))

    def test_sequence_block(self):
        [s] = parse_testbench(COUNTER_TB)
        assert isinstance(s, SequenceBlock)
        assert s.name == "sequence name"
        assert [n for n, _ in s.stages] == ["initial state", "increment", "result state"]

    def test_malformed(self):
        with pytest.raises(TBParseError):
            parse_testbench("adder.out = ;")
        with pytest.raises(TBParseError):
            parse_testbench('sequence { "a": {} };')


class TestParallelAssertions:
    """Section 6.1: transaction verification on ports happens in
    parallel by default, not in declaration order — the output
    assertion may be declared first."""

    def test_paper_adder_example(self):
        res = run_testbench(
            parse_testbench(ADDER_TB),
            PROJECT,
            {"adder": ("test", "adder")},
            {"adder": AdderModel()},
        )
        assert res.passed, res.failures

    def test_wrong_output_fails(self):
        bad = ADDER_TB.replace('"11"', '"00"')
        res = run_testbench(
            parse_testbench(bad),
            PROJECT,
            {"adder": ("test", "adder")},
            {"adder": AdderModel()},
        )
        assert not res.passed
        assert "adder.out" in res.failures[0]


class TestCombinedReverseStream:
    """Section 6.1: the same adder with inputs and output combined into
    one Stream and port, with a Reversed child for the response; the IR
    determines driven vs observed automatically."""

    def test_paper_combined_example(self):
        tb = parse_testbench(
            """
            adder.add = {
                in1: ("01", "01", "10"),
                in2: ("01", "00", "01"),
                out: ("10", "01", "11"),
            };
            """
        )
        res = run_testbench(
            tb, PROJECT, {"adder": ("test", "adder2")}, {"adder": AdderModel()}
        )
        assert res.passed, res.failures

    def test_reverse_child_is_observed_not_driven(self):
        stub = StubModel({"add.out": ("10",)})
        tb = parse_testbench('adder.add = { in1: ("01"), in2: ("01"), out: ("10") };')
        res = run_testbench(
            tb, PROJECT, {"adder": ("test", "adder2")}, {"adder": stub}
        )
        assert res.passed
        # Only the Forward children were driven.
        assert sorted(stub.driven[0]) == ["add.in1", "add.in2"]


class TestSequences:
    def test_paper_counter_example(self):
        res = run_testbench(
            parse_testbench(COUNTER_TB),
            PROJECT,
            {"counter": ("test", "counter")},
            {"counter": CounterModel()},
        )
        assert res.passed and res.stages_run == 3

    def test_stage_failure_stops_sequence(self):
        class Stuck(CounterModel):
            def transact(self, ins):
                return {"count": ["1111"]}

        res = run_testbench(
            parse_testbench(COUNTER_TB),
            PROJECT,
            {"counter": ("test", "counter")},
            {"counter": Stuck()},
        )
        assert not res.passed
        assert res.stages_run == 1  # failed at "initial state"


class TestSubstitution:
    """Section 6.2: substituting a dependency with a stub Streamlet."""

    def test_stub_records_driven_transactions(self):
        stub = StubModel({"out": ("10", "01", "11")})
        res = run_testbench(
            parse_testbench(ADDER_TB),
            PROJECT,
            {"adder": ("test", "adder")},
            {"adder": stub},
        )
        assert res.passed
        assert stub.driven == [{"in1": ["01", "01", "10"], "in2": ["01", "00", "01"]}]

    def test_substituted_model_verified_against_same_bench(self):
        # A known-good software adder and a broken one run against the
        # same testbench: only the good one passes.
        class Broken:
            def transact(self, ins):
                return {"out": ["00"] * 3}

        good = run_testbench(
            parse_testbench(ADDER_TB), PROJECT, {"adder": ("test", "adder")}, {"adder": AdderModel()}
        )
        bad = run_testbench(
            parse_testbench(ADDER_TB), PROJECT, {"adder": ("test", "adder")}, {"adder": Broken()}
        )
        assert good.passed and not bad.passed


class TestDimensionedTransactions:
    def test_bracket_data_through_transfer_layer(self):
        stub = StubModel({})
        tb = parse_testbench('sink.chars = [["1", "0"], ["0"]];')
        res = run_testbench(
            tb, PROJECT, {"sink": ("test", "seq_sink")}, {"sink": stub}
        )
        assert res.passed
        assert stub.driven[0]["chars"] == [["1", "0"], ["0"]]


class TestErrors:
    def test_unknown_instance(self):
        res = run_testbench(
            parse_testbench('ghost.x = "1";'), PROJECT, {}, {}
        )
        assert not res.passed and "unknown instance" in res.failures[0]

    def test_unknown_port(self):
        res = run_testbench(
            parse_testbench('adder.nope = "1";'),
            PROJECT,
            {"adder": ("test", "adder")},
            {"adder": AdderModel()},
        )
        assert not res.passed and "no such port" in res.failures[0]

    def test_missing_model(self):
        res = run_testbench(
            parse_testbench(ADDER_TB), PROJECT, {"adder": ("test", "adder")}, {}
        )
        assert not res.passed and "no model" in res.failures[0]

    def test_model_missing_output(self):
        res = run_testbench(
            parse_testbench(ADDER_TB),
            PROJECT,
            {"adder": ("test", "adder")},
            {"adder": StubModel({})},
        )
        assert not res.passed and "no transaction" in res.failures[0]
