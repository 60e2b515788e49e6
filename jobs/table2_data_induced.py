#!/usr/bin/env python
"""Table 2: columns pruned by the data-induced optimization."""
from repro.experiments import table2

if __name__ == "__main__":
    table2.run()
