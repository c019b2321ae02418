"""Table 7 — expert-labeled semantic join P/R/F1. Usage: python jobs/table07_expert.py [dataset]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, SMALL
from repro.eval.experiments import table7_expert
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    ctx = ExperimentContext(get_spark(), ds, SMALL)
    write_result(f"table07_{ds}", to_markdown(table7_expert(ctx), f"Table 7 ({ds})"))
