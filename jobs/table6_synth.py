"""Table 6 — SOGW vs SGSC vs GraSorw on synthetic distributions.

Reproduces the corresponding evaluation-section result on the lite datasets
(see DESIGN.md section 5 and EXPERIMENTS.md for the paper-vs-measured diff).

Run with: spark-submit jobs/table6_synth.py [--datasets NAME ...] [--out FILE]
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import job_main  # noqa: E402

from repro.core.tables import run_table6

RUNNER = lambda spark, ds: run_table6(spark, datasets=ds)


def main(argv=None):
    job_main('Table 6 — SOGW vs SGSC vs GraSorw on synthetic distributions', RUNNER, argv)


if __name__ == "__main__":
    main()
