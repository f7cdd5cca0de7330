"""Reproduce Table 7: memory usage [MB] of the index structures.

Runs the Table 6 executions and pivots their memory measurements.

    spark-submit jobs/table7.py
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import main_guard  # noqa: E402

from repro.experiments import table7  # noqa: E402

if __name__ == "__main__":
    main_guard(table7, __doc__)
