"""AXI4 / AXI4-Stream equivalents used in the paper's evaluation (§8.3)."""
