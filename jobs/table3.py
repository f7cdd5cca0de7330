"""Reproduce Table 3: Rand index on S1-S4 (cluster-overlap robustness).

    spark-submit jobs/table3.py
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import main_guard  # noqa: E402

from repro.experiments import table3  # noqa: E402

if __name__ == "__main__":
    main_guard(table3, __doc__)
