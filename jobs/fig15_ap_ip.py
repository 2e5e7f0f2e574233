"""Print the Figure 15 AP-vs-IP comparison."""
from _common import arg_parser
from repro.experiments import fig15_ap_ip

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    df = fig15_ap_ip.run(cluster=args.cluster, seed=args.seed)
    print(df.to_string(index=False))
