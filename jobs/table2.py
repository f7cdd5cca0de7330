"""Reproduce Table 2: Rand index vs noise rate on Syn.

    spark-submit jobs/table2.py            # or: python jobs/table2.py
    python jobs/table2.py --scale 0.1 --serial
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import main_guard  # noqa: E402

from repro.experiments import table2  # noqa: E402

if __name__ == "__main__":
    main_guard(table2, __doc__)
