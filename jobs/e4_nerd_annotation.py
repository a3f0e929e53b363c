#!/usr/bin/env python
"""spark-submit entrypoint — E4 NERD vs deployed alternative, text annotation (Fig 14a).

Run: `spark-submit jobs/e4_nerd_annotation.py` (or plain `python jobs/e4_nerd_annotation.py`).
Prints the experiment's paper-vs-measured table; see EXPERIMENTS.md.
"""
import inspect

from pyspark.sql import SparkSession

from repro.experiments import e4_nerd as exp


def main() -> None:
    needs_spark = "spark" in inspect.signature(exp.run).parameters
    if needs_spark:
        spark = (
            SparkSession.builder.appName("e4_nerd_annotation")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate()
        )
        result = exp.run(spark)
    else:
        result = exp.run()
    print(exp.format_rows(result))


if __name__ == "__main__":
    main()
