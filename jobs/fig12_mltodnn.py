#!/usr/bin/env python
"""Fig 12: MLtoDNN on complex GB models (GPU column modeled)."""
from _common import get_spark
from repro.experiments import fig12

if __name__ == "__main__":
    fig12.run(get_spark("fig12"))
