"""spark-submit entrypoint — Table III: dataset statistics.

Usage: spark-submit jobs/table3_datasets.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("t3", 'Table III: dataset statistics')
