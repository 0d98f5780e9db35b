"""Demand-driven, memoizing query system (paper Section 7.1)."""
