"""spark-submit entrypoint — Fig 7: partitioning runtime vs #partitions.

Usage: spark-submit jobs/fig7_runtime.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f7", 'Fig 7: partitioning runtime vs #partitions')
