"""spark-submit entrypoint for the Table 5 reproduction harness."""
import sys

from pyspark.sql import SparkSession


def main() -> int:
    spark = SparkSession.builder.appName("table5").getOrCreate()
    from repro.eval.table5 import run_table5
    out = run_table5()
    print(f"table5: {len(out) if not isinstance(out, dict) else len(out['cells'])} rows/cells written to results/")
    spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit(main())
