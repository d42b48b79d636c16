"""spark-submit entrypoint — Fig 6: partitioner space vs #partitions.

Usage: spark-submit jobs/fig6_space.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f6", 'Fig 6: partitioner space vs #partitions')
