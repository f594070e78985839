"""Benchmark-scoped fixtures and scale knobs.

Scales are chosen so the whole benchmark suite runs in a few minutes;
override with environment variables for larger runs:

- ``FIG1_ROWS``   (default 1,000,000) — paper value: 1,000,000
- ``FIG3_ROWS``   (default 2,000,000 vectorized / 200,000 row-wise) —
  paper value: 100,000,000 per input
- ``FIG3_MEM_RATIO`` (default 10) — paper value: 10 (100M rows, 10M memory)
"""
import os

import numpy as np
import pytest

FIG1_ROWS = int(os.environ.get("FIG1_ROWS", 1_000_000))
FIG3_ROWS_VEC = int(os.environ.get("FIG3_ROWS", 2_000_000))
FIG3_ROWS_ROWWISE = FIG3_ROWS_VEC // 10
FIG3_MEM_RATIO = int(os.environ.get("FIG3_MEM_RATIO", 10))


@pytest.fixture(scope="session")
def rng():
    return np.random.default_rng(2023)
