"""Candidate-set size sweep (Table 6): spark-submit entrypoint.

Usage: spark-submit jobs/table06_cand_size.py [--profile bench|test] [--seed N]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import main

if __name__ == "__main__":
    main(6)
