"""Table 3 — PB vs Bi-Block engines (RWNV + PRNV).

Reproduces the corresponding evaluation-section result on the lite datasets
(see DESIGN.md section 5 and EXPERIMENTS.md for the paper-vs-measured diff).

Run with: spark-submit jobs/table3_engines.py [--datasets NAME ...] [--out FILE]
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import job_main  # noqa: E402

from repro.core.tables import run_table3

RUNNER = lambda spark, ds: run_table3(spark, datasets=ds)


def main(argv=None):
    job_main('Table 3 — PB vs Bi-Block engines (RWNV + PRNV)', RUNNER, argv)


if __name__ == "__main__":
    main()
