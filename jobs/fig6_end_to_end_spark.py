#!/usr/bin/env python
"""Fig 6: end-to-end prediction queries on Spark vs baselines."""
from _common import get_spark
from repro.experiments import fig6

if __name__ == "__main__":
    fig6.run(get_spark("fig6"))
