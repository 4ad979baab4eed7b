"""Reproduction harnesses, one module per evaluation table of the paper."""
from repro.experiments import harness, table4, table5, table6, table7  # noqa: F401
