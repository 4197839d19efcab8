"""Table 5 — synthetic graph statistics.

Reproduces the corresponding evaluation-section result on the lite datasets
(see DESIGN.md section 5 and EXPERIMENTS.md for the paper-vs-measured diff).

Run with: spark-submit jobs/table5_synth_stats.py [--datasets NAME ...] [--out FILE]
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))
from _common import job_main  # noqa: E402

from repro.core.tables import run_table5

RUNNER = lambda spark, ds: run_table5(spark)


def main(argv=None):
    job_main('Table 5 — synthetic graph statistics', RUNNER, argv)


if __name__ == "__main__":
    main()
