"""Print Table 3 (top-5 CPS parameters per TPC-DS data size)."""
from _common import arg_parser
from repro.experiments import table3

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(table3.run(cluster=args.cluster, seed=args.seed).to_string(index=False))
