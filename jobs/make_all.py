"""Run every per-table job in sequence, producing all results/*.json files
that EXPERIMENTS.md reports.  ``--scale 0.5`` halves every workload."""
import subprocess
import sys
import os

JOBS = [
    "table_snb_answering.py",
    "table_snb_selectivity.py",
    "table_snb_qdb.py",
    "table_snb_qlen.py",
    "table_snb_overlap.py",
    "table_snb_scale.py",
    "table_indexing.py",
    "table_nyc.py",
    "table_biogrid.py",
    "table1_memory.py",
]


def main() -> None:
    here = os.path.dirname(__file__)
    extra = sys.argv[1:]
    for job in JOBS:
        print(f"\n{'=' * 70}\n== {job}\n{'=' * 70}")
        subprocess.run([sys.executable, os.path.join(here, job), *extra], check=True)


if __name__ == "__main__":
    main()
