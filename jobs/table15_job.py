#!/usr/bin/env python
"""spark-submit entrypoint for Table 15 (see repro.experiments.tables)."""
from _common import session, show
from repro.experiments import tables as T

if __name__ == "__main__":
    spark = session("mpds-table15")
    spark.sparkContext.setLogLevel("ERROR")
    fn = [f for n, f in vars(T).items() if n.startswith("table15_")][0]
    show("table15", fn(spark))
    spark.stop()
