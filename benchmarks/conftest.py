"""Benchmark fixtures: the six streams at benchmark scale.

Benchmarks run the real table pipelines at a reduced scale so
``pytest benchmarks/ --benchmark-only`` completes in minutes; the
full-scale numbers recorded in EXPERIMENTS.md come from the ``jobs/``
entrypoints (500k records, full budget sweep, more trials).
"""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).parent))

from _config import BENCH_RECORDS, BENCH_SEG_LEN  # noqa: E402
from repro.datasets.streams import DATASET_NAMES, generate


@pytest.fixture(scope="session")
def bench_streams():
    return {
        name: generate(name, n_records=BENCH_RECORDS, seg_len=BENCH_SEG_LEN)
        for name in DATASET_NAMES
    }
