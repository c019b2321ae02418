"""Table 8 — accuracy by column size (k=10). Usage: python jobs/table08_by_size.py [dataset]"""
import sys
from _common import get_spark, write_result
from repro.eval.context import ExperimentContext, Scale
from repro.eval.experiments import table8_accuracy_by_size
from repro.eval.report import to_markdown

if __name__ == "__main__":
    ds = sys.argv[1] if len(sys.argv) > 1 else "webtable"
    ctx = ExperimentContext(get_spark(), ds, Scale("size", 12_000, 2_000, 150))
    write_result(f"table08_{ds}", to_markdown(table8_accuracy_by_size(ctx), f"Table 8 ({ds})"))
