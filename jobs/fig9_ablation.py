"""spark-submit entrypoint — Fig 9: CLUGP vs CLUGP-S vs CLUGP-G ablation.

Usage: spark-submit jobs/fig9_ablation.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f9", 'Fig 9: CLUGP vs CLUGP-S vs CLUGP-G ablation')
