"""End-to-end — SOGW vs SGSC vs GraSorw (Fig. 8 as a table).

Reproduces the corresponding evaluation-section result on the lite datasets
(see DESIGN.md section 5 and EXPERIMENTS.md for the paper-vs-measured diff).

Run with: spark-submit jobs/e2e_performance.py [--datasets NAME ...] [--out FILE]
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import job_main  # noqa: E402

from repro.core.tables import run_e2e

RUNNER = lambda spark, ds: run_e2e(spark, datasets=ds)


def main(argv=None):
    job_main('End-to-end — SOGW vs SGSC vs GraSorw (Fig. 8 as a table)', RUNNER, argv)


if __name__ == "__main__":
    main()
