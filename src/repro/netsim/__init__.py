"""netsim subpackage of the GRASP reproduction."""
