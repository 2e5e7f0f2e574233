"""Print the Figure 8 QCSA results (per-query CVs and the RQA)."""
from _common import arg_parser
from repro.experiments import fig08_qcsa

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    per_query, summary = fig08_qcsa.run(cluster=args.cluster)
    print(summary.to_string(index=False))
    print(per_query.to_string(index=False))
