#!/usr/bin/env python
"""Fig 10 + data-predicate experiment: DT depth sweep on Hospital.
Pass --predicate to run the §7.2.2 equality-predicate variant."""
import sys

from _common import get_spark
from repro.experiments import fig10

if __name__ == "__main__":
    spark = get_spark("fig10")
    if "--predicate" in sys.argv:
        fig10.run_predicate_experiment(spark)
    else:
        fig10.run(spark)
