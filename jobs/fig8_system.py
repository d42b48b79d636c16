"""spark-submit entrypoint — Fig 8: simulated PageRank system cost + RTT sweep.

Usage: spark-submit jobs/fig8_system.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f8", 'Fig 8: simulated PageRank system cost + RTT sweep')
