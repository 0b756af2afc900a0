#!/usr/bin/env python
"""spark-submit entrypoint for Table 7 (see repro.experiments.tables)."""
from _common import session, show
from repro.experiments import tables as T

if __name__ == "__main__":
    spark = session("mpds-table7")
    spark.sparkContext.setLogLevel("ERROR")
    fn = [f for n, f in vars(T).items() if n.startswith("table7_")][0]
    show("table7", fn(spark))
    spark.stop()
