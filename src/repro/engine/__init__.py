"""engine subpackage of the GRASP reproduction."""
