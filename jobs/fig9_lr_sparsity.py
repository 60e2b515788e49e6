#!/usr/bin/env python
"""Fig 9: LR regularization sweep on Credit Card."""
from _common import get_spark
from repro.experiments import fig9

if __name__ == "__main__":
    fig9.run(get_spark("fig9"))
