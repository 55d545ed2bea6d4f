"""Benchmark helpers: put jobs/ on sys.path for per-figure modules."""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "jobs"))
