"""Window-slicing substrate (§5.1): paned [Li et al. 2005] and paired
[Krishnamurthy et al. 2006] windows, slice composition, Table-1 costs."""
