#!/usr/bin/env python
"""Fig 4: optimization-strategy accuracy / speedup-vs-optimal."""
from repro.experiments import fig4

if __name__ == "__main__":
    fig4.run()
