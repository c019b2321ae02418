"""Table 2 — dataset statistics. Usage: python jobs/table02_stats.py [dataset]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, SMALL
from repro.eval.experiments import table2_stats
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    ctx = ExperimentContext(get_spark(), ds, SMALL)
    write_result(f"table02_{ds}", to_markdown(table2_stats(ctx), f"Table 2 ({ds})"))
