#!/usr/bin/env python
"""Table 1: dataset statistics. Usage: spark-submit jobs/table1_datasets.py"""
from repro.experiments import table1

if __name__ == "__main__":
    table1.run()
