"""Figure 14 table reproduction. Run: python jobs/fig14_star.py"""
from figures import print_figure

if __name__ == "__main__":
    print_figure("fig14")
