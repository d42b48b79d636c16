"""spark-submit entrypoint — Fig 3: replication factor vs #partitions (web graphs).

Usage: spark-submit jobs/fig3_rf_vs_partitions.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f3", 'Fig 3: replication factor vs #partitions (web graphs)')
