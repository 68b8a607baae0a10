"""Benchmark fixtures — reuse the session SparkSession from the root
conftest and share the harness caches across all bench files (one pytest
session = one process = warm dataset/context/warmup caches)."""
import sys
from pathlib import Path

# Root conftest provides the `spark` fixture; nothing extra needed here.
