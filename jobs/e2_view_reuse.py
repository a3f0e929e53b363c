#!/usr/bin/env python
"""spark-submit entrypoint — E2 view-dependency reuse (§3.2, 26% claim).

Run: `spark-submit jobs/e2_view_reuse.py` (or plain `python jobs/e2_view_reuse.py`).
Prints the experiment's paper-vs-measured table; see EXPERIMENTS.md.
"""
import inspect

from pyspark.sql import SparkSession

from repro.experiments import e2_view_reuse as exp


def main() -> None:
    needs_spark = "spark" in inspect.signature(exp.run).parameters
    if needs_spark:
        spark = (
            SparkSession.builder.appName("e2_view_reuse")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate()
        )
        result = exp.run(spark)
    else:
        result = exp.run()
    print(exp.format_rows(result))


if __name__ == "__main__":
    main()
