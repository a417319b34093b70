"""Figure 11 table reproduction. Run: python jobs/fig11_random.py"""
from figures import print_figure

if __name__ == "__main__":
    print_figure("fig11")
