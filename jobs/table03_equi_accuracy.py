"""Table 3 — equi-join accuracy. Usage: python jobs/table03_equi_accuracy.py [dataset]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, SMALL
from repro.eval.experiments import table3_equi_accuracy
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    ctx = ExperimentContext(get_spark(), ds, SMALL)
    write_result(f"table03_{ds}", to_markdown(table3_equi_accuracy(ctx), f"Table 3 ({ds})"))
