"""Sweep harness and per-table row producers behind the jobs/ entrypoints."""
