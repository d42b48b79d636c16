"""spark-submit entrypoint — Table I: algorithm time/quality matrix.

Usage: spark-submit jobs/table1_algorithm_matrix.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("t1", 'Table I: algorithm time/quality matrix')
