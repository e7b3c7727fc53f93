"""spark-submit entrypoint reproducing the paper's Table 4 (TC).

Usage: python jobs/table4_tc.py [--timeout S] [--systems A,B] [--graphs X,Y]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _run import run_table_job

if __name__ == "__main__":
    run_table_job(4)
