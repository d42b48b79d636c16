"""spark-submit entrypoint — Fig 4: Twitter RF and total task runtime.

Usage: spark-submit jobs/fig4_twitter.py [--sf 0.05]
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from common import table_main

if __name__ == "__main__":
    table_main("f4", 'Fig 4: Twitter RF and total task runtime')
