#!/usr/bin/env python
"""Fig 11: data-induced optimizations on partitioned Hospital."""
from _common import get_spark
from repro.experiments import fig11

if __name__ == "__main__":
    fig11.run(get_spark("fig11"))
