#!/usr/bin/env python
"""spark-submit entrypoint — E1 view computation, analytics store vs legacy (Fig 8).

Run: `spark-submit jobs/e1_view_computation.py` (or plain `python jobs/e1_view_computation.py`).
Prints the experiment's paper-vs-measured table; see EXPERIMENTS.md.
"""
import inspect

from pyspark.sql import SparkSession

from repro.experiments import e1_views as exp


def main() -> None:
    needs_spark = "spark" in inspect.signature(exp.run).parameters
    if needs_spark:
        spark = (
            SparkSession.builder.appName("e1_view_computation")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate()
        )
        result = exp.run(spark)
    else:
        result = exp.run()
    print(exp.format_rows(result))


if __name__ == "__main__":
    main()
