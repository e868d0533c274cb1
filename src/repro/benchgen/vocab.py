"""Shared vocabularies for the synthetic benchmark generators.

Deliberately includes near-collision material (similar school names,
roman numerals, shared cities) so the generated tables exhibit the same
hazards as the paper's DBPedia benchmark: near-miss non-matches that
differ only in a year / numeral / sport, which stress the 2d-ball
precision estimate and negative-rule learning.
"""

YEARS = list(range(1990, 2016))

SCHOOLS = [
    "Alabama", "Auburn", "Arkansas", "Arizona", "Arizona State", "Baylor",
    "Boston College", "California", "Clemson", "Colorado", "Duke", "Florida",
    "Florida State", "Georgia", "Georgia Tech", "Houston", "Illinois",
    "Indiana", "Iowa", "Iowa State", "Kansas", "Kansas State", "Kentucky",
    "Louisville", "LSU", "Maryland", "Memphis", "Miami", "Michigan",
    "Michigan State", "Minnesota", "Mississippi", "Mississippi State",
    "Missouri", "Nebraska", "Nevada", "North Carolina", "Northwestern",
    "Notre Dame", "Ohio State", "Oklahoma", "Oklahoma State", "Oregon",
    "Oregon State", "Penn State", "Pittsburgh", "Purdue", "Rutgers",
    "Stanford", "Syracuse", "Tennessee", "Texas", "Texas Tech", "UCLA",
    "Utah", "Vanderbilt", "Virginia", "Virginia Tech", "Washington",
    "Wisconsin",
]

MASCOTS = [
    "Tigers", "Bulldogs", "Badgers", "Wildcats", "Eagles", "Bears",
    "Cougars", "Huskies", "Gators", "Wolverines", "Buckeyes", "Sooners",
    "Longhorns", "Aggies", "Jayhawks", "Hoosiers", "Spartans", "Terrapins",
    "Cavaliers", "Hokies", "Cornhuskers", "Razorbacks", "Volunteers",
    "Commodores", "Gophers", "Boilermakers", "Panthers", "Cardinals",
]

SPORTS = [
    "football", "baseball", "basketball", "soccer", "hockey", "volleyball",
    "softball", "lacrosse", "swimming", "tennis",
]

FIRST_NAMES = [
    "James", "Mary", "Robert", "Patricia", "John", "Jennifer", "Michael",
    "Linda", "David", "Elizabeth", "William", "Barbara", "Richard", "Susan",
    "Joseph", "Jessica", "Thomas", "Sarah", "Charles", "Karen",
    "Christopher", "Nancy", "Daniel", "Lisa", "Matthew", "Betty", "Anthony",
    "Margaret", "Mark", "Sandra", "Donald", "Ashley", "Steven", "Kimberly",
    "Paul", "Emily", "Andrew", "Donna", "Joshua", "Michelle", "Kenneth",
    "Carol", "Kevin", "Amanda", "Brian", "Dorothy", "George", "Melissa",
    "Edward", "Deborah",
]

LAST_NAMES = [
    "Smith", "Johnson", "Williams", "Brown", "Jones", "Garcia", "Miller",
    "Davis", "Rodriguez", "Martinez", "Hernandez", "Lopez", "Gonzalez",
    "Wilson", "Anderson", "Thomas", "Taylor", "Moore", "Jackson", "Martin",
    "Lee", "Perez", "Thompson", "White", "Harris", "Sanchez", "Clark",
    "Ramirez", "Lewis", "Robinson", "Walker", "Young", "Allen", "King",
    "Wright", "Scott", "Torres", "Nguyen", "Hill", "Flores", "Green",
    "Adams", "Nelson", "Baker", "Hall", "Rivera", "Campbell", "Mitchell",
    "Carter", "Roberts",
]

CITIES = [
    "Springfield", "Riverside", "Franklin", "Greenville", "Bristol",
    "Clinton", "Fairview", "Salem", "Madison", "Georgetown", "Arlington",
    "Ashland", "Dover", "Oxford", "Jackson", "Burlington", "Manchester",
    "Milton", "Newport", "Auburn", "Centerville", "Clayton", "Dayton",
    "Lexington", "Milford", "Winchester", "Hudson", "Kingston", "Chester",
    "Columbia", "Hamilton", "Trenton", "Lancaster", "Monroe", "Norwood",
    "Princeton", "Richmond", "Somerset", "Waverly", "Westfield",
]

HOSPITAL_KINDS = [
    "General", "Memorial", "Regional", "University", "Community",
    "Methodist", "Baptist", "Sacred Heart", "Saint Mary's", "Veterans",
]

DRUG_PREFIXES = [
    "Acet", "Benz", "Cort", "Dexa", "Ergo", "Fluo", "Gluc", "Hydro",
    "Ibu", "Keto", "Levo", "Metho", "Nitro", "Oxy", "Pred", "Quin",
    "Rito", "Sulfa", "Tetra", "Vanco",
]

DRUG_SUFFIXES = [
    "pril", "olol", "statin", "mycin", "cillin", "azole", "dipine",
    "profen", "zepam", "tidine", "oxacin", "dronate", "gliptin", "sartan",
]

SONG_WORDS = [
    "Love", "Night", "Heart", "Dream", "Fire", "Rain", "Summer", "Dance",
    "Blue", "Golden", "Midnight", "Broken", "Wild", "Sweet", "Lonely",
    "River", "Shadow", "Light", "Forever", "Yesterday", "Tomorrow", "Home",
    "Road", "Star", "Moon", "Sun", "Ocean", "Storm", "Angel", "Ghost",
]

ARTISTS = [
    "The Meridians", "Silver Foxes", "Nora Vale", "The Lanterns",
    "Cole Bennett", "Ruby Skies", "The Half Moons", "Ezra Stone",
    "Paper Tigers", "June Carver", "The Old Pines", "Margo Wells",
    "Static Hearts", "The Night Owls", "Ivy Monroe", "Glass Animals Club",
]

AWARD_ORGS = [
    "National Film", "Academy of Music", "Television Critics",
    "Literary Guild", "Science Writers", "Broadcast Journalism",
    "Theatre Circle", "Documentary Society",
]

AWARD_CATEGORIES = [
    "Director", "Actor", "Actress", "Screenplay", "Cinematography",
    "Original Score", "Documentary", "Newcomer", "Ensemble", "Editing",
]

STADIUM_NAMES = [
    "Liberty", "Veterans", "Riverfront", "Memorial", "Century", "Pioneer",
    "Summit", "Harbor", "Granite", "Falcon", "Eagle Ridge", "Northgate",
    "Southpoint", "Lakeside", "Hillcrest", "Union", "Capital", "Heritage",
    "Frontier", "Grandview",
]

STADIUM_KINDS = ["Stadium", "Arena", "Field", "Park", "Coliseum"]

PRODUCT_BRANDS = [
    "Axiom", "Borealis", "Cascade", "Dynamo", "Everest", "Fulcrum",
    "Gemini", "Horizon", "Ion", "Juniper", "Kinetic", "Lumen", "Meridian",
    "Nimbus", "Orbit", "Pinnacle", "Quasar", "Radiant", "Sterling", "Titan",
]

PRODUCT_NOUNS = [
    "Blender", "Camera", "Drill", "Headphones", "Kettle", "Lamp",
    "Monitor", "Printer", "Router", "Speaker", "Toaster", "Vacuum",
    "Charger", "Keyboard", "Projector", "Scanner",
]

MOVIE_WORDS = [
    "Crimson", "Tide", "Last", "First", "Empire", "Return", "Secret",
    "Garden", "Winter", "Spring", "King", "Queen", "Lost", "City",
    "Silent", "Voice", "Iron", "Glass", "Golden", "Hour", "Dark",
    "Water", "Burning", "Sky", "Paper", "Moon", "Distant", "Shore",
]

DIRECTORS = [
    "Alan Reed", "Bianca Cole", "Carl Mendes", "Dana Whitfield",
    "Elliot Crane", "Farah Nassar", "Gordon Pike", "Helena Marsh",
    "Ivan Petrov", "Joan Castellanos", "Kurt Weller", "Lena Holmgren",
]

NOISE_WORDS = [
    "the", "of", "and", "with", "for", "a", "an", "in", "on", "classic",
    "original", "new", "special", "deluxe", "edition", "series", "model",
]
