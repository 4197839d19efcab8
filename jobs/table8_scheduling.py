"""Table 8 — current-block scheduling strategies.

Reproduces the corresponding evaluation-section result on the lite datasets
(see DESIGN.md section 5 and EXPERIMENTS.md for the paper-vs-measured diff).

Run with: spark-submit jobs/table8_scheduling.py [--datasets NAME ...] [--out FILE]
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import job_main  # noqa: E402

from repro.core.tables import run_table8

RUNNER = lambda spark, ds: run_table8(spark, datasets=tuple(ds) if ds else ('lj_lite', 'tw_lite', 'fr_lite', 'uk_lite'))


def main(argv=None):
    job_main('Table 8 — current-block scheduling strategies', RUNNER, argv)


if __name__ == "__main__":
    main()
