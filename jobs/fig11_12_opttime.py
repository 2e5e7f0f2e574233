"""Print the Figure 11/12 optimization-time reduction table."""
from _common import arg_parser
from repro.experiments import fig11_12_opttime

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    df = fig11_12_opttime.run(cluster=args.cluster, seed=args.seed)
    print(df.to_string(index=False))
    print(fig11_12_opttime.summarize(df).to_string(index=False))
