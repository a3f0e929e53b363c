#!/usr/bin/env python
"""spark-submit entrypoint — E0 incremental-vs-batch construction (§2.4).

Run: `spark-submit jobs/e0_incremental.py` (or plain `python jobs/e0_incremental.py`).
Prints the experiment's paper-vs-measured table; see EXPERIMENTS.md.
"""
import inspect

from pyspark.sql import SparkSession

from repro.experiments import e0_incremental as exp


def main() -> None:
    needs_spark = "spark" in inspect.signature(exp.run).parameters
    if needs_spark:
        spark = (
            SparkSession.builder.appName("e0_incremental")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate()
        )
        result = exp.run(spark)
    else:
        result = exp.run()
    print(exp.format_rows(result))


if __name__ == "__main__":
    main()
