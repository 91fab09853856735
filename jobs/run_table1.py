"""Table 1: print the workload queries, their bindings, and their canonical
SGA plans (one logical plan per query per dataset).

Usage:  spark-submit jobs/run_table1.py   (or plain ``python``)
"""
import sys

from repro.core.algebra import explain_sga
from repro.queries.workload import DATASETS, QUERIES, all_queries, table1_text


def main(out=sys.stdout) -> None:
    print(table1_text(), file=out)
    print("\nCanonical SGA plans (window T=30, slide β=1):\n", file=out)
    for ds in DATASETS:
        print(f"== dataset: {ds} ==", file=out)
        for wq in all_queries(ds):
            print(f"-- {wq.name} [{wq.kind}] {' '.join(wq.text.split())}", file=out)
            print(explain_sga(wq.plan(30, 1), indent=1), file=out)
    print(f"\n{len(QUERIES)} queries x {len(DATASETS)} datasets.", file=out)


if __name__ == "__main__":
    main()
