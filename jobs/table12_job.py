#!/usr/bin/env python
"""spark-submit entrypoint for Table 12 (see repro.experiments.tables)."""
from _common import session, show
from repro.experiments import tables as T

if __name__ == "__main__":
    spark = session("mpds-table12")
    spark.sparkContext.setLogLevel("ERROR")
    fn = [f for n, f in vars(T).items() if n.startswith("table12_")][0]
    show("table12", fn(spark))
    spark.stop()
