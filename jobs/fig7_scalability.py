#!/usr/bin/env python
"""Fig 7: Raven vs no-opt across Hospital dataset sizes."""
from _common import get_spark
from repro.experiments import fig7

if __name__ == "__main__":
    fig7.run(get_spark("fig7"))
