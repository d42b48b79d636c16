"""spark-submit entrypoint — Fig 10: game parallelization sweeps.

Usage: spark-submit jobs/fig10_parallel.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f10", 'Fig 10: game parallelization sweeps')
