"""Make tests/ importable (for the shared ``_util`` helpers) and jobs/
importable (so tests can drive the per-table entrypoints) regardless of
pytest's rootdir-based sys.path handling."""
import os
import sys

_here = os.path.dirname(__file__)
sys.path.insert(0, _here)
sys.path.insert(0, os.path.join(os.path.dirname(_here), "jobs"))
