"""Transaction-level testing syntax and runner (paper Section 6)."""

from .grammar import FieldAssertion, PortAssertion, SequenceBlock, parse_testbench  # noqa: F401
from .runner import TestbenchResult, run_testbench  # noqa: F401
