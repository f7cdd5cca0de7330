"""Reproduce Table 5: running time vs accuracy of S-Approx-DPC across eps.

    spark-submit jobs/table5.py
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import main_guard  # noqa: E402

from repro.experiments import table5  # noqa: E402

if __name__ == "__main__":
    main_guard(table5, __doc__)
