"""Figure 13 table reproduction. Run: python jobs/fig13_chain.py"""
from figures import print_figure

if __name__ == "__main__":
    print_figure("fig13")
