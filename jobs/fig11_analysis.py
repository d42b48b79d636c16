"""spark-submit entrypoint — Fig 11: tau and relative-weight sweeps.

Usage: spark-submit jobs/fig11_analysis.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f11", 'Fig 11: tau and relative-weight sweeps')
