"""Reproduce Table 4: Rand index of LSH-DDP / Approx-DPC on real-like data.

    spark-submit jobs/table4.py
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import main_guard  # noqa: E402

from repro.experiments import table4  # noqa: E402

if __name__ == "__main__":
    main_guard(table4, __doc__)
