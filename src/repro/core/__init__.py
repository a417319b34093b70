"""The paper's contribution: window coverage theory (§2), the cost-based
optimization framework over the WCG (§3), and factor windows (§4)."""
