"""Comparison systems for Table 6 (§6.1)."""
from repro.baselines.systems import SYSTEMS, SystemSpec, run_system  # noqa: F401
