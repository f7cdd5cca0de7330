"""Reproduce Table 6: decomposed rho/delta time of all seven algorithms on
the four real-like datasets (also emits the dist_evals work metric and
the memory column that feeds Table 7).

    spark-submit jobs/table6.py
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import main_guard  # noqa: E402

from repro.experiments import table6  # noqa: E402

if __name__ == "__main__":
    main_guard(table6, __doc__)
