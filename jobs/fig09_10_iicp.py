"""Print the Figure 9/10 IICP sample-count and reduction tables."""
from _common import arg_parser
from repro.experiments import fig09_10_iicp

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(fig09_10_iicp.run_fig9(cluster=args.cluster).to_string(index=False))
    print(fig09_10_iicp.run_fig10(cluster=args.cluster).to_string(index=False))
