"""Print the Figure 17 IICP-vs-GBRT comparison."""
from _common import arg_parser
from repro.experiments import fig17_iicp_gbrt

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(fig17_iicp_gbrt.run(cluster=args.cluster).to_string(index=False))
