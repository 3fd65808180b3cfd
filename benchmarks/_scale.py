"""Benchmark scale selection: REPRO_SCALE=test for a quick pass."""
import os

SCALE = os.environ.get("REPRO_SCALE", "bench")
