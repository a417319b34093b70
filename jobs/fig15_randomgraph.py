"""Figure 15 table reproduction. Run: python jobs/fig15_randomgraph.py"""
from figures import print_figure

if __name__ == "__main__":
    print_figure("fig15")
