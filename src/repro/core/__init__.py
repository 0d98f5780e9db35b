"""Core Tydi-IR: logical types, physical lowering, and IR declarations."""
