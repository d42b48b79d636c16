"""spark-submit entrypoint — Fig 5: RF vs sampled graph size.

Usage: spark-submit jobs/fig5_sample_sizes.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f5", 'Fig 5: RF vs sampled graph size')
