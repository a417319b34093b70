"""Figure 12 table reproduction. Run: python jobs/fig12_random_tumbling.py"""
from figures import print_figure

if __name__ == "__main__":
    print_figure("fig12")
