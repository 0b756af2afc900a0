#!/usr/bin/env python
"""spark-submit entrypoint for Table 10 (see repro.experiments.tables)."""
from _common import session, show
from repro.experiments import tables as T

if __name__ == "__main__":
    spark = session("mpds-table10")
    spark.sparkContext.setLogLevel("ERROR")
    fn = [f for n, f in vars(T).items() if n.startswith("table10_")][0]
    show("table10", fn(spark))
    spark.stop()
