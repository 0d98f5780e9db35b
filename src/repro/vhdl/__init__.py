"""VHDL backend: emits Tydi-IR Streamlets as VHDL (paper Section 7.3)."""

from .emit import emit_project, register_vhdl_queries  # noqa: F401
